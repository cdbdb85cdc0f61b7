"""Fig. 4 — pruning-strategy ablation: time per combination + pruned counts.

Paper shape: each added strategy prunes more candidates and lowers the wall
clock; the influential-score pruning (which includes the Lemma-7 heap early
stop) adds the most. Pruned counts per query land in extra_info →
bench_output.txt.
"""
from __future__ import annotations

import pytest

from repro.core.pruning import PruningStats
from repro.core.topl import topl_icde
from repro.experiments.fig4 import COMBOS
from repro.experiments.runner import make_query


@pytest.mark.parametrize("combo", [c[0] for c in COMBOS])
def test_fig4_pruning_combo(benchmark, uni_prepared, combo):
    flags = dict(COMBOS)[combo]
    prep = uni_prepared
    q = make_query(qseed=0)

    def run():
        stats = PruningStats()
        topl_icde(prep.local, prep.index, q, prep.pre.thetas, stats=stats, **flags)
        return stats

    stats = benchmark.pedantic(run, rounds=3, iterations=1, warmup_rounds=1)
    benchmark.extra_info["pruned"] = stats.total_pruned
    benchmark.extra_info["refined"] = stats.refined
    benchmark.extra_info["by_rule"] = {
        "keyword": stats.keyword,
        "support": stats.support,
        "score": stats.score,
        "heap_stop": stats.heap_terminated,
    }
