"""TABLE I benchmark: dataset generation + statistics for all ten datasets."""
from benchmarks._bench_common import bench_scale, one_shot

from repro.experiments.io import save_results
from repro.experiments.tables import TABLE1_COLUMNS, table1_rows


def test_table1_datasets(benchmark):
    rows = one_shot(benchmark, table1_rows, scale=bench_scale())
    save_results("bench_table1", rows, TABLE1_COLUMNS)
    assert len(rows) == 10
    for r in rows:
        assert r["our_m"] >= 200 and r["our_n"] >= 60
