"""TABLE II benchmark: the five upper-bound ratios over all ten datasets.

The workload is distributed across queries with Spark (the paper's
1000-query convention, scaled down); the resulting ratio table is saved to
results/bench_table2.md and checked for the paper's qualitative ordering.
"""
import pytest

from benchmarks._bench_common import bench_queries, bench_scale, one_shot

from repro.experiments.io import save_results
from repro.experiments.tables import TABLE2_COLUMNS, table2_rows


def test_table2_upper_bound_ratio(benchmark, spark):
    rows = one_shot(
        benchmark,
        table2_rows,
        spark,
        scale=bench_scale(),
        n_queries=bench_queries(),
    )
    save_results("bench_table2", rows, TABLE2_COLUMNS)
    assert len(rows) == 10
    for r in rows:
        # Paper ordering: dt ≤ es ≤ tg = quick ≤ tight (tight is tightest).
        assert r["dt_ours"] <= r["es_ours"] + 1e-9
        assert r["es_ours"] <= r["quick_ours"] + 1e-9
        assert r["tg_ours"] == pytest.approx(r["quick_ours"], abs=1e-9)
        assert r["quick_ours"] <= r["tight_ours"] + 1e-9
