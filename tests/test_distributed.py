"""The dataflow online path (Catalyst pruning + mapInPandas refinement)
must return exactly the same communities as driver-side Algorithm 3."""
from __future__ import annotations

import pytest

from repro.core.topl import Query, topl_icde
from repro.core.topl_distributed import topl_icde_spark


def q_default(**overrides):
    base = dict(keywords=frozenset({"kw0", "kw1", "kw2", "kw3", "kw4"}), k=4, r=2, theta=0.2, L=5)
    base.update(overrides)
    return Query(**base)


@pytest.mark.parametrize(
    "q",
    [q_default(), q_default(k=3, L=3), q_default(r=1, theta=0.1)],
    ids=["default", "k3L3", "r1t01"],
)
def test_matches_driver_algorithm(spark, prepared_small, q):
    got = topl_icde_spark(spark, prepared_small.pre, prepared_small.local, q)
    want = topl_icde(prepared_small.local, prepared_small.index, q, prepared_small.pre.thetas)
    assert [round(c.sigma, 6) for c in got] == [round(c.sigma, 6) for c in want]
    assert {c.vertices for c in got} == {c.vertices for c in want}


def test_small_batches_early_stop(spark, prepared_small):
    """Tiny batches force the between-batch σ_L early stop to fire — the
    result must still be exact."""
    q = q_default()
    got = topl_icde_spark(spark, prepared_small.pre, prepared_small.local, q, batch_size=8)
    want = topl_icde(prepared_small.local, prepared_small.index, q, prepared_small.pre.thetas)
    assert [round(c.sigma, 6) for c in got] == [round(c.sigma, 6) for c in want]


def test_empty_result(spark, prepared_small):
    q = q_default(keywords=frozenset({"nope"}))
    assert topl_icde_spark(spark, prepared_small.pre, prepared_small.local, q) == []
