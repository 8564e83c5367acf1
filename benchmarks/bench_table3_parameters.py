"""Benchmark: Table III / Fig. 3 CPSJoin parameter sweep at lambda=0.5."""
import pytest

from repro.experiments import table3_rows

from benchmarks._common import BENCH_SCALE, BENCH_T, append_rows, run_once

SWEEP_DATASETS = ("DBLP", "UNIFORM005")


@pytest.mark.benchmark(group="table3")
@pytest.mark.parametrize("name", SWEEP_DATASETS)
def test_table3_sweep(spark, benchmark, name):
    rows = run_once(
        benchmark,
        lambda: table3_rows(spark, [name], scale=BENCH_SCALE, t=BENCH_T),
    )
    append_rows(
        "table3", rows,
        header=f"# Table III sweep {name}, scale={BENCH_SCALE} t={BENCH_T}",
    )
    assert len(rows) == 10  # 3 limit + 3 eps + 4 ell settings
    assert all(r["time_s"] > 0 for r in rows)
