"""Online TopL-ICDE processing (paper Algorithm 3).

Best-first traversal of the tree index with a max-heap keyed by the
influential-score upper bound ``N.σ_z``; index entries are pruned with
Lemmas 5–7, leaf vertices with Lemmas 1/2/4; surviving centers are refined —
maximal seed community extraction (Def. 2 fixpoint) plus the exact
``calculate_influence`` — against the driver-side graph snapshot.

The traversal terminates early as soon as the popped key cannot beat the
current top-L floor σ_L (heap order ⇒ nothing later can either).
"""
from __future__ import annotations

import heapq
import itertools
import math
from dataclasses import dataclass, field
from typing import Dict, FrozenSet, List, Optional, Sequence, Set

from repro.core.index import IndexNode
from repro.core.keywords import bv_of
from repro.core.precompute import z_index
from repro.core.pruning import (
    PruningStats,
    keyword_prune,
    score_prune,
    support_prune,
)
from repro.graph.local import LocalGraph


@dataclass(frozen=True)
class Query:
    """One TopL-ICDE query (Def. 4): (Q, k, r, θ, L)."""

    keywords: FrozenSet[str]
    k: int
    r: int
    theta: float
    L: int


@dataclass
class Community:
    """A seed community answer with its influenced community attached."""

    center: int
    vertices: FrozenSet[int]
    sigma: float
    #: cpp(g, v) over g^Inf — carried so DTopL-ICDE can reuse it (Eq. 6)
    cpp: Dict[int, float] = field(default_factory=dict, repr=False)


def topl_icde(
    local: LocalGraph,
    index: IndexNode,
    query: Query,
    thetas: Sequence[float],
    *,
    use_keyword: bool = True,
    use_support: bool = True,
    use_score: bool = True,
    stats: Optional[PruningStats] = None,
) -> List[Community]:
    """Algorithm 3. Returns up to L communities, best σ first.

    ``use_*`` flags switch individual pruning rules off for the ablation
    study (Fig. 4); with ``use_score=False`` the heap early-termination is
    disabled too (it is the same Lemma 7 bound).
    """
    if not (1 <= query.r <= len(index.bv)):
        raise ValueError(f"query radius {query.r} outside precomputed [1, {len(index.bv)}]")
    stats = stats if stats is not None else PruningStats()
    z = z_index(thetas, query.theta)
    ri = query.r - 1
    qbv = bv_of(query.keywords)

    # top-L buffer: min-heap of (sigma, tiebreak, Community); σ_L = floor.
    results: List[tuple] = []
    tiebreak = itertools.count()
    seen: Set[FrozenSet[int]] = set()

    def sigma_l() -> float:
        return results[0][0] if len(results) >= query.L else -math.inf

    def have_l() -> bool:
        return len(results) >= query.L

    heap: List[tuple] = [(-index.sigma[ri][z], next(tiebreak), index)]
    while heap:
        neg_key, _, node = heapq.heappop(heap)
        key = -neg_key
        stats.visited_nodes += 1
        if use_score and have_l() and key <= sigma_l():
            # Lemma 7 on the heap order: every remaining entry is bounded by
            # `key`, so the whole frontier is pruned at once.
            stats.heap_terminated += sum(n.size for _, _, n in heap) + node.size
            break
        if node.is_leaf:
            for entry in node.entries:
                # Lemma 1 twice: on the hop subgraph's aggregated bit vector
                # and on the center's own (the center must be in g, Def. 2).
                if use_keyword and (
                    keyword_prune(entry.bv[ri], qbv)
                    or keyword_prune(entry.bv_self, qbv)
                ):
                    stats.keyword += 1
                    continue
                if use_support and support_prune(entry.ub_sup[ri], query.k):
                    stats.support += 1
                    continue
                if use_score and score_prune(entry.sigma[ri][z], sigma_l(), have_l()):
                    stats.score += 1
                    continue
                stats.refined += 1
                g = local.seed_community(entry.vertex, query.r, query.k, set(query.keywords))
                if g is None or g in seen:
                    continue
                seen.add(g)
                cpp = local.influence(g, query.theta)
                sigma = float(sum(cpp.values()))
                comm = Community(center=entry.vertex, vertices=g, sigma=sigma, cpp=cpp)
                if len(results) < query.L:
                    heapq.heappush(results, (sigma, next(tiebreak), comm))
                elif sigma > results[0][0]:
                    heapq.heapreplace(results, (sigma, next(tiebreak), comm))
        else:
            for child in node.children:
                if use_keyword and (
                    keyword_prune(child.bv[ri], qbv)
                    or keyword_prune(child.bv_self, qbv)
                ):
                    stats.keyword += child.size
                    continue
                if use_support and support_prune(child.ub_sup[ri], query.k):
                    stats.support += child.size
                    continue
                if use_score and score_prune(child.sigma[ri][z], sigma_l(), have_l()):
                    stats.score += child.size
                    continue
                heapq.heappush(heap, (-child.sigma[ri][z], next(tiebreak), child))

    return [c for _, _, c in sorted(results, key=lambda t: (-t[0], t[1]))]


def brute_force_topl(
    local: LocalGraph, query: Query
) -> List[Community]:
    """Reference answer: refine every vertex, no index, no pruning.

    Used by tests to prove the pruned traversal exact, and by the ATindex
    baseline as its (trussness-filtered) inner loop.
    """
    best: Dict[FrozenSet[int], Community] = {}
    for v in sorted(local.vertices()):
        g = local.seed_community(v, query.r, query.k, set(query.keywords))
        if g is None or g in best:
            continue
        cpp = local.influence(g, query.theta)
        best[g] = Community(center=v, vertices=g, sigma=float(sum(cpp.values())), cpp=cpp)
    ranked = sorted(best.values(), key=lambda c: (-c.sigma, c.center))
    return ranked[: query.L]
