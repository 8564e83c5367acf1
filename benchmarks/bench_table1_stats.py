"""Benchmark: Table I dataset statistics over all 14 clones."""
import pytest

from repro.experiments import ALL_DATASETS, table1_rows

from benchmarks._common import BENCH_SCALE, append_rows, run_once


@pytest.mark.benchmark(group="table1")
def test_table1_dataset_stats(spark, benchmark):
    rows = run_once(
        benchmark, lambda: table1_rows(spark, ALL_DATASETS, scale=BENCH_SCALE)
    )
    append_rows("table1", rows, header=f"# Table I stats, scale={BENCH_SCALE}")
    assert len(rows) == 14
