"""DTopL-ICDE — diversified top-L detection (paper Sec. VII).

The diversity score ``D(S) = Σ_v max_{g∈S} cpp(g, v)`` (Eq. 6) is monotone
and submodular, and maximising it over L communities is NP-hard (Lemma 8,
reduction from Maximum Coverage). The paper's pipeline:

1. run TopL-ICDE (Alg. 3) for the top-``n·L`` candidates;
2. pick L of them greedily by marginal gain ΔD_g(S) —
   * ``Greedy_WoP``: recompute every candidate's gain each round;
   * ``Greedy_WP`` (Alg. 4): lazy greedy — a max-heap of stale gains with
     round stamps; submodularity (gains only shrink) makes a re-validated
     top-of-heap provably optimal for the round (Lemma 9), skipping most
     recomputations;
3. ``Optimal``: exhaustive search over all C(|T|, L) combinations — the
   accuracy yardstick (Fig. 6e) and the "three orders of magnitude" baseline.

Both greedy variants return identical sets (same tie-breaking); tests verify
that, the (1-1/e)·ε guarantee behaviour, and submodularity itself.
"""
from __future__ import annotations

import heapq
import itertools
from dataclasses import dataclass, field
from typing import Dict, List, Optional, Sequence, Tuple

from repro.core.index import IndexNode
from repro.core.topl import Community, Query, topl_icde
from repro.graph.local import LocalGraph
from repro.influence.scores import diversity_score, marginal_gain, merge_max


@dataclass
class DiversifyStats:
    """Work counters: gain evaluations vs. the n·L·L worst case."""

    gain_evaluations: int = 0
    candidates: int = 0
    pruned_evaluations: int = 0
    extra: dict = field(default_factory=dict)


def greedy_wp(
    candidates: Sequence[Community], L: int, stats: Optional[DiversifyStats] = None
) -> List[Community]:
    """Algorithm 4: lazy greedy with diversity-score pruning (Lemma 9).

    Heap keys start at σ(g) = ΔD_g(∅); an entry popped with a stale round
    stamp is re-evaluated against the current S and pushed back. A popped
    entry whose stamp is current is the round's argmax — every candidate
    still below it in the heap was pruned without recomputation.
    """
    stats = stats if stats is not None else DiversifyStats()
    stats.candidates = len(candidates)
    heap: List[Tuple[float, int, int]] = []  # (-gain, tiebreak, cand index)
    rounds = [0] * len(candidates)
    for i, c in enumerate(candidates):
        heapq.heappush(heap, (-c.sigma, i, i))
        stats.gain_evaluations += 1  # σ(g) plays ΔD_g(∅)
    selected: List[Community] = []
    acc: Dict[int, float] = {}
    round_no = 0
    while heap and len(selected) < L:
        neg_gain, tb, i = heapq.heappop(heap)
        if rounds[i] == round_no:
            selected.append(candidates[i])
            merge_max(acc, candidates[i].cpp)
            round_no += 1
        else:
            gain = marginal_gain(acc, candidates[i].cpp)
            stats.gain_evaluations += 1
            rounds[i] = round_no
            heapq.heappush(heap, (-gain, tb, i))
    stats.pruned_evaluations = (
        len(candidates) * len(selected) - stats.gain_evaluations
    )
    return selected


def greedy_wop(
    candidates: Sequence[Community], L: int, stats: Optional[DiversifyStats] = None
) -> List[Community]:
    """Greedy without pruning: every round scans every remaining candidate."""
    stats = stats if stats is not None else DiversifyStats()
    stats.candidates = len(candidates)
    remaining = list(range(len(candidates)))
    selected: List[Community] = []
    acc: Dict[int, float] = {}
    while remaining and len(selected) < L:
        best_i, best_gain = None, -1.0
        for i in remaining:
            gain = marginal_gain(acc, candidates[i].cpp)
            stats.gain_evaluations += 1
            # tie-break on candidate order = insertion (σ-descending) order,
            # identical to greedy_wp's heap tiebreak
            if gain > best_gain + 1e-12:
                best_i, best_gain = i, gain
        selected.append(candidates[best_i])
        merge_max(acc, candidates[best_i].cpp)
        remaining.remove(best_i)
    return selected


def optimal(
    candidates: Sequence[Community], L: int
) -> Tuple[List[Community], float, int]:
    """Exhaustive maximum of D(S) over all size-L subsets of the candidates.

    DFS over combinations in lexicographic order with running pointwise-max
    vectors, so sibling combinations share their common prefix's work —
    identical answers (and tie-breaking) to naive ``itertools.combinations``
    enumeration (tested), but ~L× less arithmetic. Still exponential; this
    *is* the paper's "three orders of magnitude slower" baseline.
    """
    import numpy as np

    n = len(candidates)
    L = min(L, n)
    if L == 0:
        return [], 0.0, 0
    universe = sorted({v for c in candidates for v in c.cpp})
    col = {v: i for i, v in enumerate(universe)}
    mat = np.zeros((n, len(universe)))
    for i, c in enumerate(candidates):
        for v, p in c.cpp.items():
            mat[i, col[v]] = p
    best = {"d": -1.0, "combo": (), "count": 0}

    def dfs(start: int, chosen: tuple, acc: "np.ndarray") -> None:
        if len(chosen) == L:
            best["count"] += 1
            d = float(acc.sum())
            if d > best["d"] + 1e-12:
                best["d"] = d
                best["combo"] = chosen
            return
        remaining = L - len(chosen)
        for i in range(start, n - remaining + 1):
            dfs(i + 1, chosen + (i,), np.maximum(acc, mat[i]))

    dfs(0, (), np.zeros(len(universe)))
    return [candidates[i] for i in best["combo"]], best["d"], best["count"]


def dtopl_icde(
    local: LocalGraph,
    index: IndexNode,
    query: Query,
    thetas: Sequence[float],
    *,
    n: int = 5,
    method: str = "wp",
    stats: Optional[DiversifyStats] = None,
) -> List[Community]:
    """Full DTopL-ICDE pipeline: top-(n·L) via Alg. 3, then refinement.

    ``method``: ``"wp"`` (Alg. 4), ``"wop"``, or ``"optimal"``.
    """
    pool_query = Query(
        keywords=query.keywords,
        k=query.k,
        r=query.r,
        theta=query.theta,
        L=query.L * n,
    )
    pool = topl_icde(local, index, pool_query, thetas)
    if method == "wp":
        return greedy_wp(pool, query.L, stats)
    if method == "wop":
        return greedy_wop(pool, query.L, stats)
    if method == "optimal":
        return optimal(pool, query.L)[0]
    raise ValueError(f"unknown method {method!r}")
