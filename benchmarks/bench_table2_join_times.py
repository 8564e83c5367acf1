"""Benchmark: Table II join times (CPSJoin vs MinHash vs AllPairs).

One benchmark per (dataset, lambda) cell over a representative subset
of the grid; the full 14x5 grid is ``jobs/table2_join_times.py``.  The
benchmark time covers all three joins of the cell; the per-algorithm
seconds (the actual Table II payload) are in the appended rows.
"""
import pytest

from repro.experiments import table2_rows

from benchmarks._common import BENCH_SCALE, BENCH_T, TIMING_DATASETS, append_rows, run_once

LAMS = (0.5, 0.7, 0.9)


@pytest.mark.benchmark(group="table2")
@pytest.mark.parametrize("lam", LAMS)
@pytest.mark.parametrize("name", TIMING_DATASETS)
def test_table2_cell(spark, benchmark, name, lam):
    rows = run_once(
        benchmark,
        lambda: table2_rows(
            spark, [name], [lam], scale=BENCH_SCALE, t=BENCH_T, ell=8
        ),
    )
    append_rows(
        "table2", rows,
        header=f"# Table II cell {name} lam={lam}, scale={BENCH_SCALE} t={BENCH_T}",
    )
    [r] = rows
    assert r["cp_s"] > 0 and r["mh_s"] > 0 and r["all_s"] > 0
    assert r["cp_recall"] >= 0.9 or r["n_results"] < 10
