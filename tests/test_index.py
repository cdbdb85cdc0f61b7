"""Tree-index construction invariants (paper Sec. V-B)."""
from __future__ import annotations

import pytest

from repro.core.index import IndexNode, build_index


@pytest.fixture(scope="module")
def index(prepared_small):
    return prepared_small.index


def walk(node: IndexNode):
    yield node
    if not node.is_leaf:
        for c in node.children:
            yield from walk(c)


def leaves(node: IndexNode):
    return [n for n in walk(node) if n.is_leaf]


def test_every_vertex_exactly_once(index, prepared_small):
    ids = [e.vertex for leaf in leaves(index) for e in leaf.entries]
    assert sorted(ids) == sorted(prepared_small.local.adj.keys())


def test_size_fields_consistent(index):
    for node in walk(index):
        if node.is_leaf:
            assert node.size == len(node.entries)
        else:
            assert node.size == sum(c.size for c in node.children)


def test_leaf_capacity(index):
    for leaf in leaves(index):
        assert 1 <= len(leaf.entries) <= 16


def test_fanout_bound(index):
    for node in walk(index):
        if not node.is_leaf:
            assert 1 <= len(node.children) <= 16


def test_height_consistent(index, prepared_small):
    import math

    n = len(prepared_small.local.adj)
    assert index.height() <= math.ceil(math.log(max(n, 2), 2)) + 1


def test_aggregates_cover_children(index):
    """Non-leaf aggregates must dominate every child (bit-OR superset,
    max support, max σ) — the soundness condition for Lemmas 5–7."""
    for node in walk(index):
        if node.is_leaf:
            continue
        for c in node.children:
            assert node.bv_self & c.bv_self == c.bv_self
            for ri in range(len(node.bv)):
                assert node.bv[ri] & c.bv[ri] == c.bv[ri]
                assert node.ub_sup[ri] >= c.ub_sup[ri]
                for z in range(len(node.sigma[ri])):
                    assert node.sigma[ri][z] >= c.sigma[ri][z] - 1e-12


def test_leaf_aggregates_cover_entries(index):
    for leaf in leaves(index):
        for e in leaf.entries:
            assert leaf.bv_self & e.bv_self == e.bv_self
            for ri in range(len(leaf.bv)):
                assert leaf.bv[ri] & e.bv[ri] == e.bv[ri]
                assert leaf.ub_sup[ri] >= e.ub_sup[ri]
                for z in range(len(leaf.sigma[ri])):
                    assert leaf.sigma[ri][z] >= e.sigma[ri][z] - 1e-12


def test_entries_match_precompute_rows(index, prepared_small):
    pre = prepared_small.pre
    by_vertex = {
        e.vertex: e for leaf in leaves(index) for e in leaf.entries
    }
    for (_, row) in pre.pdf.sample(n=30, random_state=0).iterrows():
        e = by_vertex[int(row["vertex"])]
        ri = int(row["r"]) - 1
        assert e.bv[ri] == int(row["bv_r"])
        assert e.ub_sup[ri] == int(row["ub_sup_r"])
        for z in range(len(pre.thetas)):
            assert e.sigma[ri][z] == pytest.approx(float(row[f"sigma_{z}"]))


def test_small_fanout_deepens_tree(prepared_small):
    wide = build_index(prepared_small.pre, fanout=64)
    deep = build_index(prepared_small.pre, fanout=4)
    assert deep.height() >= wide.height()
    assert deep.size == wide.size


def test_root_sigma_is_global_max(index, prepared_small):
    pre = prepared_small.pre
    for ri, r in enumerate(sorted(pre.pdf["r"].unique())):
        want = float(pre.pdf[pre.pdf["r"] == r]["sigma_0"].max())
        assert index.sigma[ri][0] == pytest.approx(want)
