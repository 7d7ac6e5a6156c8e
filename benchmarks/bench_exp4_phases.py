"""Exp-4 benchmark: per-phase VUG time over all datasets."""
from benchmarks._bench_common import bench_queries, bench_scale, one_shot

from repro.experiments.io import save_results
from repro.experiments.perf import EXP4_COLUMNS, exp4_rows


def test_exp4_phase_breakdown(benchmark, spark):
    rows = one_shot(
        benchmark,
        exp4_rows,
        spark,
        scale=bench_scale(),
        n_queries=bench_queries(),
    )
    save_results("bench_exp4", rows, EXP4_COLUMNS)
    assert len(rows) == 10
    for r in rows:
        assert r["total_s"] > 0
        assert 0 <= r["eev_pct"] <= 100
