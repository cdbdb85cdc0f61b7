"""Fig. 6 — DTopL-ICDE: Greedy_WP vs Greedy_WoP vs Optimal + sweeps.

Paper shapes: WP ≈ WoP, both orders of magnitude faster than Optimal;
smooth growth in L, n, |V|; accuracy vs Optimal ≈ 100% (Fig. 6e asserts the
ratio in extra_info rather than timing it).
"""
from __future__ import annotations

import math

import pytest

from repro.core.diversify import greedy_wop, greedy_wp, optimal
from repro.core.topl import topl_icde
from repro.experiments import params as P
from repro.experiments.datasets import prepare
from repro.experiments.runner import make_query
from repro.influence.scores import diversity_score

DATASETS = ["Uni", "Gau", "Zipf", "DBLP-like", "Amazon-like"]


def _pool(prep, *, n=P.N_DTOPL, L=P.L, qseed=0):
    q = make_query(sigma=prep.key[3], qseed=qseed, L=n * L)
    return topl_icde(prep.local, prep.index, q, prep.pre.thetas)


def _run(prep, method, *, n=P.N_DTOPL, L=P.L):
    pool = _pool(prep, n=n, L=L)
    if method == "wp":
        return greedy_wp(pool, L)
    if method == "wop":
        return greedy_wop(pool, L)
    return optimal(pool, L)[0]


@pytest.mark.parametrize("method", ["wp", "wop", "optimal"])
@pytest.mark.parametrize("dataset", DATASETS)
def test_fig6a_methods(benchmark, fig2_prepared, dataset, method):
    prep = fig2_prepared[dataset]
    rounds = 1 if method == "optimal" else 3
    sel = benchmark.pedantic(
        lambda: _run(prep, method), rounds=rounds, iterations=1
    )
    benchmark.extra_info["diversity"] = round(
        diversity_score([c.cpp for c in sel]), 2
    )


@pytest.mark.parametrize("L", P.SWEEP_L)
def test_fig6b_L(benchmark, uni_prepared, L):
    benchmark.pedantic(
        lambda: _run(uni_prepared, "wp", L=L), rounds=3, iterations=1
    )


@pytest.mark.parametrize("n", P.SWEEP_N_DTOPL)
def test_fig6c_n(benchmark, uni_prepared, n):
    benchmark.pedantic(
        lambda: _run(uni_prepared, "wp", n=n), rounds=3, iterations=1
    )


@pytest.mark.parametrize("nv", P.SWEEP_NV)
def test_fig6d_scale(benchmark, spark, nv):
    prep = prepare(spark, kind="nws", dist="uniform", n=nv)
    benchmark.pedantic(lambda: _run(prep, "wp"), rounds=3, iterations=1)


@pytest.mark.parametrize("dist", P.DISTRIBUTIONS)
def test_fig6e_accuracy(benchmark, spark, dist):
    """Fig. 6(e): times Greedy_WP on the 1K accuracy graphs and records
    D(WP)/D(Optimal) — the paper reports 99.863%–100%."""
    prep = prepare(spark, kind="nws", dist=dist, n=1_000)
    pool = _pool(prep)
    sel = benchmark.pedantic(lambda: greedy_wp(pool, P.L), rounds=3, iterations=1)
    d_wp = diversity_score([c.cpp for c in sel])
    _, d_opt, _ = optimal(pool, P.L)
    ratio = d_wp / d_opt if d_opt > 0 else float("nan")
    benchmark.extra_info["accuracy_pct"] = round(100 * ratio, 3)
    assert math.isnan(ratio) or ratio >= 1 - 1 / math.e - 1e-9
