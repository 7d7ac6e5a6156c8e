"""Exp-7 benchmark: tspG edge counts vs (capped) simple-path counts."""
from benchmarks._bench_common import bench_queries, bench_scale, one_shot

from repro.experiments.io import save_results
from repro.experiments.perf import EXP7_COLUMNS, exp7_rows


def test_exp7_paths_vs_edges(benchmark, spark):
    rows = one_shot(
        benchmark,
        exp7_rows,
        spark,
        scale=bench_scale(),
        n_queries=bench_queries(),
        max_paths=200_000,
    )
    save_results("bench_exp7", rows, EXP7_COLUMNS)
    # Paper shape: the number of paths far exceeds the number of edges on
    # the dense settings (D1/D8 at their largest swept θ).
    tops = [r for r in rows if r["theta"] == max(x["theta"] for x in rows if x["key"] == r["key"])]
    assert any(
        r["paths_capped"] > 0 or r["tspg_paths"] > 5 * r["tspg_edges"]
        for r in tops
    ), f"path counts never dominate edge counts: {rows}"
