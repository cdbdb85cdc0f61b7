"""Tests for the driver-side reference algorithms (graph/local.py).

Brute-force checks on hand-built graphs (paths, rings, cliques) plus
property checks on generated graphs.
"""
from __future__ import annotations

import itertools
import math

import pandas as pd
import pytest

from repro.core.keywords import bv_of
from repro.graph.local import LocalGraph


def make_local(und_edges, n=None, keywords=None, weights=None) -> LocalGraph:
    """Build a LocalGraph from an undirected edge list (both orientations
    get weight ``weights.get((u,v), 0.55)``)."""
    vs = sorted({u for e in und_edges for u in e} | set(range(n or 0)))
    kws = keywords or {v: ["kw0"] for v in vs}
    verts = pd.DataFrame(
        {
            "id": vs,
            "keywords": [kws.get(v, ["kw0"]) for v in vs],
            "bv": [bv_of(kws.get(v, ["kw0"])) for v in vs],
        }
    )
    rows = []
    w = weights or {}
    for u, v in und_edges:
        rows.append((u, v, w.get((u, v), 0.55)))
        rows.append((v, u, w.get((v, u), 0.55)))
    edges = pd.DataFrame(rows, columns=["src", "dst", "weight"])
    return LocalGraph.from_pandas(verts, edges)


K5_EDGES = list(itertools.combinations(range(5), 2))
PATH = [(0, 1), (1, 2), (2, 3), (3, 4)]
RING6 = [(i, (i + 1) % 6) for i in range(6)]


class TestBFS:
    def test_path_distances(self):
        g = make_local(PATH)
        assert g.khop(0, 10) == {0: 0, 1: 1, 2: 2, 3: 3, 4: 4}

    def test_radius_cut(self):
        g = make_local(PATH)
        assert set(g.khop(0, 2)) == {0, 1, 2}

    def test_ring_wraps(self):
        g = make_local(RING6)
        assert g.khop(0, 3)[3] == 3
        assert g.khop(0, 3)[5] == 1

    def test_allowed_restriction(self):
        g = make_local(PATH)
        # vertex 2 blocked → 3, 4 unreachable
        assert set(g.khop(0, 10, allowed={0, 1, 3, 4})) == {0, 1}

    def test_allowed_excluding_center(self):
        g = make_local(PATH)
        assert g.khop(0, 2, allowed={1, 2}) == {}

    def test_missing_center(self):
        g = make_local(PATH)
        assert g.khop(99, 2) == {}

    def test_khop_within(self):
        g = make_local(K5_EDGES)
        assert g.khop_within({0, 1, 2}, 0) == {0: 0, 1: 1, 2: 1}


class TestSupportAndTruss:
    def test_k5_support(self):
        g = make_local(K5_EDGES)
        sup = g.induced_support(set(range(5)))
        assert all(s == 3 for s in sup.values())  # each edge in 3 triangles

    def test_path_support_zero(self):
        g = make_local(PATH)
        sup = g.induced_support(set(range(5)))
        assert all(s == 0 for s in sup.values())

    def test_k5_is_5truss(self):
        g = make_local(K5_EDGES)
        vs, es = g.ktruss(set(range(5)), 5)
        assert vs == set(range(5)) and len(es) == 10

    def test_k5_not_6truss(self):
        g = make_local(K5_EDGES)
        vs, es = g.ktruss(set(range(5)), 6)
        assert vs == set() and es == set()

    def test_k4_is_4truss(self):
        g = make_local(list(itertools.combinations(range(4), 2)))
        vs, es = g.ktruss(set(range(4)), 4)
        assert vs == set(range(4)) and len(es) == 6

    def test_truss_peels_pendant(self):
        # K4 with a pendant vertex 4 attached to 0
        g = make_local(list(itertools.combinations(range(4), 2)) + [(0, 4)])
        vs, es = g.ktruss(set(range(5)), 4)
        assert vs == set(range(4))

    def test_truss_subset_restriction(self):
        g = make_local(K5_EDGES)
        vs, es = g.ktruss({0, 1, 2}, 3)  # triangle on {0,1,2}
        assert vs == {0, 1, 2} and len(es) == 3

    def test_k2_keeps_everything(self):
        g = make_local(PATH)
        vs, es = g.ktruss(set(range(5)), 2)
        assert len(es) == 4

    def test_truss_monotone_in_k(self):
        g = make_local(K5_EDGES + [(4, 5), (5, 6), (6, 4)])
        sizes = []
        for k in (2, 3, 4, 5, 6):
            _, es = g.ktruss(set(g.vertices()), k)
            sizes.append(len(es))
        assert sizes == sorted(sizes, reverse=True)

    def test_nws_truss_brute_force(self, local_small):
        """Peeled result is a fixpoint: every surviving edge meets support,
        and it is maximal (re-adding any removed edge breaks the property
        chain — checked by peeling from the full graph again)."""
        vs, es = local_small.ktruss(set(local_small.vertices()), 4)
        sup = local_small.induced_support(vs, es)
        assert all(s >= 2 for s in sup.values())


class TestComponentAndCore:
    def test_component(self):
        g = make_local(PATH + [(10, 11)], n=12)
        assert g.connected_component(0, {(0, 1), (1, 2), (10, 11)}) == {0, 1, 2}

    def test_component_isolated_start(self):
        g = make_local(PATH)
        assert g.connected_component(4, set()) == {4}

    def test_kcore_ring(self):
        g = make_local(RING6)
        assert g.kcore(set(range(6)), 2) == set(range(6))
        assert g.kcore(set(range(6)), 3) == set()

    def test_kcore_k5_plus_tail(self):
        g = make_local(K5_EDGES + [(4, 5), (5, 6)])
        assert g.kcore(set(range(7)), 4) == set(range(5))

    def test_kcore_brute_force_small(self, local_small):
        core = local_small.kcore(set(local_small.vertices()), 4)
        for v in core:
            assert len(local_small.adj[v] & core) >= 4


class TestInfluence:
    def brute_force_upp(self, g: LocalGraph, src: int, theta: float):
        """Enumerate all simple paths (DFS) and take the max product."""
        best = {src: 1.0}

        def dfs(u, p, seen):
            for v, w in g.out.get(u, []):
                q = p * w
                if q < theta or v in seen:
                    continue
                if q > best.get(v, 0.0):
                    best[v] = q
                dfs(v, q, seen | {v})

        dfs(src, 1.0, {src})
        return {v: p for v, p in best.items() if p >= theta}

    @pytest.mark.parametrize("src", [0, 7, 23])
    @pytest.mark.parametrize("theta", [0.1, 0.3])
    def test_single_source_vs_bruteforce(self, tiny_frames, src, theta):
        verts, edges = tiny_frames
        g = LocalGraph.from_pandas(verts, edges)
        got = g.influence([src], theta)
        want = self.brute_force_upp(g, src, theta)
        assert set(got) == set(want)
        for v in want:
            assert got[v] == pytest.approx(want[v], abs=1e-12)

    def test_multi_source_is_pointwise_max(self, tiny_frames):
        verts, edges = tiny_frames
        g = LocalGraph.from_pandas(verts, edges)
        seeds = [0, 5, 9]
        got = g.influence(seeds, 0.15)
        singles = [g.influence([s], 0.15) for s in seeds]
        want = {}
        for m in singles:
            for v, p in m.items():
                want[v] = max(want.get(v, 0.0), p)
        assert set(got) == set(want)
        for v in want:
            assert got[v] == pytest.approx(want[v], abs=1e-12)

    def test_seeds_have_cpp_one(self, local_small):
        got = local_small.influence([3, 4, 5], 0.2)
        assert got[3] == got[4] == got[5] == 1.0

    def test_threshold_monotone(self, local_small):
        lo = local_small.influence([0], 0.1)
        hi = local_small.influence([0], 0.3)
        assert set(hi) <= set(lo)
        for v in hi:
            assert hi[v] == pytest.approx(lo[v], abs=1e-12)

    def test_sigma_monotone_in_seed_set(self, local_small):
        """σ is monotone under seed growth — the argument for refining only
        the maximal community per center (DESIGN.md §4)."""
        s1 = local_small.sigma([0, 1], 0.2)
        s2 = local_small.sigma([0, 1, 2, 3], 0.2)
        assert s2 >= s1 - 1e-12

    def test_all_values_above_theta(self, local_medium):
        got = local_medium.influence([10], 0.2)
        assert all(p >= 0.2 for p in got.values())

    def test_path_product(self):
        w = {(0, 1): 0.6, (1, 2): 0.5, (2, 3): 0.58}
        g = make_local(PATH, weights=w)
        got = g.influence([0], 0.05)
        assert got[2] == pytest.approx(0.6 * 0.5)
        assert got[3] == pytest.approx(0.6 * 0.5 * 0.58)


class TestSeedCommunity:
    def kw(self, mapping):
        return {v: kws for v, kws in mapping.items()}

    def test_simple_clique_found(self):
        g = make_local(K5_EDGES, keywords={v: ["kw1"] for v in range(5)})
        got = g.seed_community(0, 2, 4, {"kw1"})
        assert got == frozenset(range(5))

    def test_center_without_keyword_rejected(self):
        kws = {v: ["kw1"] for v in range(5)}
        kws[0] = ["kw9"]
        g = make_local(K5_EDGES, keywords=kws)
        assert g.seed_community(0, 2, 4, {"kw1"}) is None

    def test_keyword_filter_shrinks(self):
        kws = {v: ["kw1"] for v in range(5)}
        kws[4] = ["kw9"]  # vertex 4 filtered out; K4 on {0,1,2,3} remains
        g = make_local(K5_EDGES, keywords=kws)
        got = g.seed_community(0, 2, 4, {"kw1"})
        assert got == frozenset({0, 1, 2, 3})

    def test_truss_too_strict(self):
        g = make_local(K5_EDGES)
        assert g.seed_community(0, 2, 6, {"kw0"}) is None

    def test_radius_enforced_within_g(self):
        # two K4s sharing vertex 3: 0-3 and 3-6; center 0 with r=1 keeps
        # only its own K4 (distance to the far K4 inside g exceeds 1)
        k4a = list(itertools.combinations(range(4), 2))
        k4b = list(itertools.combinations(range(3, 7), 2))
        g = make_local(k4a + k4b)
        got = g.seed_community(0, 1, 4, {"kw0"})
        assert got == frozenset({0, 1, 2, 3})

    def test_no_edges_rejected_for_k3(self):
        g = make_local(PATH)  # no triangles at all
        assert g.seed_community(0, 2, 3, {"kw0"}) is None

    def test_k2_returns_radius_ball(self):
        g = make_local(PATH)
        got = g.seed_community(2, 1, 2, {"kw0"})
        assert got == frozenset({1, 2, 3})

    def test_result_is_valid(self, local_medium):
        """Every produced community satisfies all Def. 2 constraints."""
        q = {"kw0", "kw1", "kw2", "kw3", "kw4"}
        checked = 0
        for center in list(local_medium.vertices())[:80]:
            got = local_medium.seed_community(center, 2, 4, q)
            if got is None:
                continue
            checked += 1
            assert center in got
            # keyword constraint
            for v in got:
                assert local_medium.keywords[v] & q
            # truss constraint
            sup = local_medium.induced_support(set(got))
            assert all(s >= 2 for s in sup.values())
            # connectivity + radius within g
            dist = local_medium.khop_within(set(got), center)
            assert set(dist) == set(got)
            assert max(dist.values()) <= 2
        assert checked > 0, "fixture produced no communities to validate"

    def test_fixpoint_stability(self, local_medium):
        """Running extraction on its own result returns the same set."""
        q = {"kw0", "kw1", "kw2", "kw3", "kw4"}
        for center in list(local_medium.vertices())[:40]:
            got = local_medium.seed_community(center, 2, 4, q)
            if got is None:
                continue
            vs, es = local_medium.ktruss(set(got), 4)
            assert vs == set(got)
            break
