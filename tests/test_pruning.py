"""Pruning predicates (Lemmas 1–7): unit behaviour + global safety.

Safety means: a candidate center pruned by any rule can never host a
community that belongs in the brute-force top-L answer.
"""
from __future__ import annotations

import math

import pytest

from repro.core.keywords import bv_of
from repro.core.pruning import (
    PruningStats,
    keyword_prune,
    score_prune,
    support_prune,
)
from repro.core.topl import Query, brute_force_topl, topl_icde


class TestPredicates:
    def test_keyword_prune_disjoint(self):
        assert keyword_prune(bv_of(["kw0"]), bv_of(["kw1"])) in (True, False)
        assert not keyword_prune(bv_of(["kw0", "kw5"]), bv_of(["kw5"]))

    def test_keyword_prune_empty_query(self):
        assert keyword_prune(bv_of(["kw0"]), 0)

    def test_keyword_prune_empty_vertex(self):
        assert keyword_prune(0, bv_of(["kw0"]))

    @pytest.mark.parametrize(
        "ub,k,want",
        [
            (2, 4, False),  # K4 case: support 2 CAN host a 4-truss
            (1, 4, True),
            (0, 3, True),
            (0, 2, False),
            (-1, 2, True),  # NO_EDGE_SUPPORT sentinel: no edges at all
            (10, 5, False),
        ],
    )
    def test_support_prune_safe_form(self, ub, k, want):
        assert support_prune(ub, k) is want

    def test_score_prune_requires_full_buffer(self):
        assert not score_prune(1.0, 5.0, have_l=False)
        assert score_prune(1.0, 5.0, have_l=True)
        assert score_prune(5.0, 5.0, have_l=True)  # ≤ prunes ties
        assert not score_prune(5.1, 5.0, have_l=True)

    def test_stats_total(self):
        s = PruningStats(keyword=2, support=3, score=4, heap_terminated=1)
        assert s.total_pruned == 10


class TestSafety:
    """No pruned candidate is a true answer (exactness of the traversal)."""

    QUERIES = [
        Query(frozenset({"kw0", "kw1", "kw2", "kw3", "kw4"}), 4, 2, 0.2, 5),
        Query(frozenset({"kw5", "kw6"}), 3, 1, 0.1, 3),
        Query(frozenset({"kw2", "kw9", "kw11"}), 4, 3, 0.3, 8),
        Query(frozenset({"kw0"}), 5, 2, 0.2, 2),
    ]

    @pytest.mark.parametrize("q", QUERIES, ids=lambda q: f"k{q.k}r{q.r}L{q.L}")
    def test_pruned_traversal_equals_brute_force(self, prepared_small, q):
        got = topl_icde(prepared_small.local, prepared_small.index, q, prepared_small.pre.thetas)
        want = brute_force_topl(prepared_small.local, q)
        assert [round(c.sigma, 6) for c in got] == [round(c.sigma, 6) for c in want]

    @pytest.mark.parametrize(
        "flags",
        [
            dict(use_keyword=False, use_support=False, use_score=False),
            dict(use_keyword=True, use_support=False, use_score=False),
            dict(use_keyword=True, use_support=True, use_score=False),
            dict(use_keyword=False, use_support=True, use_score=True),
        ],
        ids=["none", "kw", "kw+sup", "sup+score"],
    )
    def test_any_flag_combination_is_exact(self, prepared_small, flags):
        q = self.QUERIES[0]
        got = topl_icde(
            prepared_small.local, prepared_small.index, q, prepared_small.pre.thetas, **flags
        )
        want = brute_force_topl(prepared_small.local, q)
        assert [round(c.sigma, 6) for c in got] == [round(c.sigma, 6) for c in want]

    def test_more_pruning_never_more_refinement(self, prepared_small):
        q = self.QUERIES[0]
        refined = []
        for flags in (
            dict(use_keyword=False, use_support=False, use_score=False),
            dict(use_keyword=True, use_support=False, use_score=False),
            dict(use_keyword=True, use_support=True, use_score=False),
            dict(use_keyword=True, use_support=True, use_score=True),
        ):
            st = PruningStats()
            topl_icde(
                prepared_small.local, prepared_small.index, q, prepared_small.pre.thetas,
                stats=st, **flags,
            )
            refined.append(st.refined)
        assert refined == sorted(refined, reverse=True)

    def test_counters_partition_candidates(self, prepared_small):
        """pruned + refined ≤ |V| (heap termination may skip the rest)."""
        q = self.QUERIES[0]
        st = PruningStats()
        topl_icde(
            prepared_small.local, prepared_small.index, q, prepared_small.pre.thetas, stats=st
        )
        n = len(prepared_small.local.adj)
        assert st.refined + st.total_pruned <= n
        assert st.refined >= 0 and st.total_pruned >= 0
