"""Exp-6 benchmark: EEV vs path enumeration, both applied on Gt."""
from benchmarks._bench_common import bench_queries, bench_scale, one_shot

from repro.experiments.io import save_results
from repro.experiments.perf import EXP6_COLUMNS, exp6_rows


def test_exp6_eev_vs_enum(benchmark, spark):
    rows = one_shot(
        benchmark,
        exp6_rows,
        spark,
        scale=bench_scale(),
        n_queries=bench_queries(),
        sweeps={"D1": [10], "D8": [8, 10, 12]},
    )
    save_results("bench_exp6", rows, EXP6_COLUMNS)
    # Paper shape: EEV beats enumeration by an order of magnitude on dense
    # settings.  At bench scale D8/θ≥10 shows 10-1000×; the reduced test
    # scale still has to show a clear (≥3×) advantage or budget blowup.
    dense = [r for r in rows if r["key"] == "D8" and r["theta"] >= 10]
    assert any(
        r["enum_inf"] > 0 or r["speedup"] >= 3 for r in dense
    ), f"no dense setting shows the EEV advantage: {dense}"
