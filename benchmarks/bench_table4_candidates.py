"""Benchmark: Table IV candidate pipeline counts (ALL vs CP)."""
import pytest

from repro.experiments import table4_rows

from benchmarks._common import BENCH_SCALE, BENCH_T, append_rows, run_once

DATASETS4 = ("DBLP", "NETFLIX", "AOL", "TOKENS10K", "TOKENS20K", "UNIFORM005")


@pytest.mark.benchmark(group="table4")
@pytest.mark.parametrize("lam", (0.5, 0.7))
@pytest.mark.parametrize("name", DATASETS4)
def test_table4_cell(spark, benchmark, name, lam):
    rows = run_once(
        benchmark,
        lambda: table4_rows(
            spark, [name], [lam], scale=BENCH_SCALE, t=BENCH_T, ell=8
        ),
    )
    append_rows(
        "table4", rows,
        header=f"# Table IV cell {name} lam={lam}, scale={BENCH_SCALE} t={BENCH_T}",
    )
    [r] = rows
    assert r["all_pre"] >= r["all_cand"] >= r["all_res"]
    assert r["cp_pre"] >= r["cp_cand"] >= r["cp_res"]
