"""Online TopL-ICDE processing (Algorithm 3) — exactness and behaviour."""
from __future__ import annotations

import pytest

from repro.core.pruning import PruningStats
from repro.core.topl import Community, Query, brute_force_topl, topl_icde


def run(prep, q, **kw):
    return topl_icde(prep.local, prep.index, q, prep.pre.thetas, **kw)


def q_default(**overrides):
    base = dict(keywords=frozenset({"kw0", "kw1", "kw2", "kw3", "kw4"}), k=4, r=2, theta=0.2, L=5)
    base.update(overrides)
    return Query(**base)


class TestExactness:
    @pytest.mark.parametrize("k", [3, 4, 5])
    def test_varying_k(self, prepared_small, k):
        q = q_default(k=k)
        got = run(prepared_small, q)
        want = brute_force_topl(prepared_small.local, q)
        assert [round(c.sigma, 6) for c in got] == [round(c.sigma, 6) for c in want]

    @pytest.mark.parametrize("r", [1, 2, 3])
    def test_varying_r(self, prepared_small, r):
        q = q_default(r=r)
        got = run(prepared_small, q)
        want = brute_force_topl(prepared_small.local, q)
        assert [round(c.sigma, 6) for c in got] == [round(c.sigma, 6) for c in want]

    @pytest.mark.parametrize("theta", [0.1, 0.2, 0.25, 0.3, 0.5])
    def test_varying_theta(self, prepared_small, theta):
        q = q_default(theta=theta)
        got = run(prepared_small, q)
        want = brute_force_topl(prepared_small.local, q)
        assert [round(c.sigma, 6) for c in got] == [round(c.sigma, 6) for c in want]

    @pytest.mark.parametrize("L", [1, 2, 5, 10, 50])
    def test_varying_L(self, prepared_small, L):
        q = q_default(L=L)
        got = run(prepared_small, q)
        want = brute_force_topl(prepared_small.local, q)
        assert [round(c.sigma, 6) for c in got] == [round(c.sigma, 6) for c in want]

    @pytest.mark.parametrize(
        "kws",
        [frozenset({"kw0"}), frozenset({"kw1", "kw7"}), frozenset(f"kw{i}" for i in range(10))],
        ids=["one", "two", "ten"],
    )
    def test_varying_keywords(self, prepared_small, kws):
        q = q_default(keywords=kws)
        got = run(prepared_small, q)
        want = brute_force_topl(prepared_small.local, q)
        assert [round(c.sigma, 6) for c in got] == [round(c.sigma, 6) for c in want]


class TestBehaviour:
    def test_results_sorted_descending(self, prepared_small):
        got = run(prepared_small, q_default(L=10))
        sigmas = [c.sigma for c in got]
        assert sigmas == sorted(sigmas, reverse=True)

    def test_at_most_L(self, prepared_small):
        assert len(run(prepared_small, q_default(L=3))) <= 3

    def test_no_duplicate_vertex_sets(self, prepared_small):
        got = run(prepared_small, q_default(L=20))
        sets = [c.vertices for c in got]
        assert len(sets) == len(set(sets))

    def test_every_answer_is_valid_community(self, prepared_small):
        q = q_default(L=10)
        local = prepared_small.local
        got = run(prepared_small, q)
        assert got, "expected at least one community on the fixture graph"
        for c in got:
            assert c.center in c.vertices
            for v in c.vertices:
                assert local.keywords[v] & q.keywords
            sup = local.induced_support(set(c.vertices))
            assert all(s >= q.k - 2 for s in sup.values())
            dist = local.khop_within(set(c.vertices), c.center)
            assert set(dist) == set(c.vertices) and max(dist.values()) <= q.r

    def test_sigma_matches_cpp(self, prepared_small):
        for c in run(prepared_small, q_default()):
            assert c.sigma == pytest.approx(sum(c.cpp.values()))
            assert all(p >= 0.2 for p in c.cpp.values())

    def test_impossible_keywords_empty(self, prepared_small):
        got = run(prepared_small, q_default(keywords=frozenset({"nope"})))
        assert got == []

    def test_huge_k_empty(self, prepared_small):
        assert run(prepared_small, q_default(k=30)) == []

    def test_radius_out_of_range_raises(self, prepared_small):
        with pytest.raises(ValueError):
            run(prepared_small, q_default(r=9))

    def test_theta_below_grid_raises(self, prepared_small):
        with pytest.raises(ValueError):
            run(prepared_small, q_default(theta=0.01))

    def test_stats_visited_nodes_positive(self, prepared_small):
        st = PruningStats()
        run(prepared_small, q_default(), stats=st)
        assert st.visited_nodes > 0

    def test_l1_is_global_max(self, prepared_small):
        top1 = run(prepared_small, q_default(L=1))
        top10 = run(prepared_small, q_default(L=10))
        assert top1[0].sigma == pytest.approx(top10[0].sigma)

    def test_larger_L_extends_prefix(self, prepared_small):
        small = run(prepared_small, q_default(L=3))
        large = run(prepared_small, q_default(L=8))
        assert [round(c.sigma, 6) for c in small] == [
            round(c.sigma, 6) for c in large[:3]
        ]
