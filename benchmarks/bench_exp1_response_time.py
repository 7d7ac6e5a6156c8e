"""Exp-1 benchmark: total response time of the four algorithms, all datasets.

The EP baselines run with a reduced expansion budget so that INF queries
terminate quickly; VUG runs uncapped (it needs no budget).  The headline
shape to reproduce: VUG is fastest everywhere and the enumeration baselines
exhaust the budget (INF) on the dense datasets.
"""
from benchmarks._bench_common import bench_queries, bench_scale, one_shot

from repro.experiments.io import save_results
from repro.experiments.perf import EXP1_COLUMNS, exp1_rows


def test_exp1_response_time(benchmark, spark):
    rows = one_shot(
        benchmark,
        exp1_rows,
        spark,
        scale=bench_scale(),
        n_queries=bench_queries(),
        max_expansions=200_000,
    )
    save_results("bench_exp1", rows, EXP1_COLUMNS)
    assert len(rows) == 10
    for r in rows:
        assert isinstance(r["VUG_s"], float), "VUG must never go INF"
        for algo in ("EPdtTSG_s", "EPesTSG_s", "EPtgTSG_s"):
            v = r[algo]
            if isinstance(v, float):
                # When a baseline finishes, VUG must not be slower than it
                # by more than noise on sparse datasets.
                assert r["VUG_s"] <= v * 5
