"""Integration tests for the experiment drivers (shrunk to test scale)."""
from __future__ import annotations

import pytest

from repro.experiments import datasets as D
from repro.experiments import params as P
from repro.experiments.runner import make_query, summarize, timed_atindex, timed_topl


@pytest.fixture(autouse=True)
def shrink(monkeypatch):
    """Run every driver at toy scale: the drivers read these at call time."""
    monkeypatch.setattr(P, "N_VERTICES", 150)
    monkeypatch.setattr(D, "DBLP_LIKE_N", 150)
    monkeypatch.setattr(D, "AMAZON_LIKE_N", 150)
    monkeypatch.setattr(D, "FIG2_NWS_N", 150)
    monkeypatch.setattr(P, "QUERY_SEEDS", (0,))
    monkeypatch.setattr(P, "SWEEP_NV", (100, 150))
    yield


def test_prepare_caches(spark):
    a = D.prepare(spark, kind="nws", n=150, dist="uniform", seed=2)
    b = D.prepare(spark, kind="nws", n=150, dist="uniform", seed=2)
    assert a is b


def test_prepare_records_timings(spark):
    p = D.prepare(spark, kind="nws", n=150, dist="uniform", seed=2)
    assert {"generate", "precompute", "index", "snapshot"} <= set(p.timings)


def test_table2_stats(spark):
    rows = D.table2_stats(spark)
    assert {r["dataset"] for r in rows} == {"Uni", "Gau", "Zipf", "DBLP-like", "Amazon-like"}
    for r in rows:
        assert r["num_vertices"] == 150 and r["num_edges"] > 0


def test_make_query_uses_domain(spark):
    q = make_query(sigma=10, qsize=4, qseed=1)
    assert len(q.keywords) == 4
    assert all(kw.startswith("kw") for kw in q.keywords)


def test_timed_topl_runs(spark):
    prep = D.prepare(spark, kind="nws", n=150, dist="uniform", seed=2)
    secs, answers = timed_topl(prep, qseeds=(0, 1))
    assert secs >= 0 and len(answers) == 2
    digest = summarize(answers)
    assert digest["avg_found"] >= 0


def test_timed_atindex_extrapolates(spark):
    prep = D.prepare(spark, kind="nws", n=150, dist="uniform", seed=2, with_atindex=True)
    full, _ = timed_atindex(prep, qseeds=(0,))
    sampled, _ = timed_atindex(prep, qseeds=(0,), sample=0.5)
    assert full > 0 and sampled > 0  # sampled time is scaled by 1/f


def test_fig3_query_sweep_shape(spark):
    from repro.experiments import fig3

    rows = fig3.sweep_k(spark)
    assert len(rows) == len(P.SWEEP_K) * len(P.DISTRIBUTIONS)
    assert all(r["seconds"] >= 0 for r in rows)


def test_fig3_scale_sweep(spark):
    from repro.experiments import fig3

    rows = fig3.sweep_scale(spark)
    assert [r["value"] for r in rows] == [100, 150]


def test_fig4_ablation_shape(spark):
    from repro.experiments import fig4

    rows = fig4.run(spark)
    assert len(rows) == 5 * 3
    by_ds = {}
    for r in rows:
        by_ds.setdefault(r["dataset"], []).append(r)
    for ds, rs in by_ds.items():
        pruned = [r["pruned_per_query"] for r in rs]
        assert pruned == sorted(pruned), f"more pruning methods must prune ≥ ({ds})"


def test_fig5_case_study(spark):
    from repro.experiments import fig5

    res = fig5.run(spark)
    if res.get("found"):
        assert res["truss"]["size"] >= 1
        assert res["truss"]["sigma"] > 0


def test_fig6_accuracy_bounds(spark):
    from repro.experiments import fig6

    rows = fig6.accuracy(spark, n=150)
    import math

    for r in rows:
        if r["accuracy_pct"] is not None:
            assert 100 * (1 - 1 / math.e) - 1e-6 <= r["accuracy_pct"] <= 100.0 + 1e-6


def test_fig6_dtopl_methods(spark):
    from repro.experiments import fig6

    rows = fig6.run_datasets(spark, include_optimal=False)
    assert {r["method"] for r in rows} == {"wp", "wop"}
    by_ds = {}
    for r in rows:
        by_ds.setdefault(r["dataset"], {})[r["method"]] = r["diversity"]
    for ds, d in by_ds.items():
        assert d["wp"] == pytest.approx(d["wop"], abs=1e-6)
