"""Shared helpers for the table benchmarks.

Benchmarks run each experiment cell exactly once (``pedantic`` with one
round — a Spark join is not a microbenchmark) and append the harness
rows to ``bench_results/<table>.txt`` so EXPERIMENTS.md can be refreshed
from a bench run.

Scale/grid knobs (env): ``REPRO_BENCH_SCALE`` (default 0.5),
``REPRO_BENCH_T`` (default 64 MinHash coordinates; the paper uses 128 —
halved here to keep the suite's wall time down without changing any
qualitative outcome).
"""
import os

BENCH_SCALE = float(os.environ.get("REPRO_BENCH_SCALE", "0.5"))
BENCH_T = int(os.environ.get("REPRO_BENCH_T", "64"))
RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "bench_results")

#: Representative dataset subset for timing benches: the paper's two
#: archetypes (NETFLIX-like dense vs FLICKR/AOL-like rare-token), the
#: TOKENS robustness family, and UNIFORM.
TIMING_DATASETS = (
    "AOL", "DBLP", "NETFLIX", "FLICKR", "KOSARAK",
    "TOKENS10K", "TOKENS20K", "UNIFORM005",
)


def append_rows(table: str, rows: list[dict], header: str = "") -> None:
    """Append formatted harness rows to ``bench_results/<table>.txt``."""
    from repro.experiments import format_rows

    os.makedirs(RESULTS_DIR, exist_ok=True)
    path = os.path.join(RESULTS_DIR, f"{table}.txt")
    with open(path, "a") as f:
        if header:
            f.write(header.rstrip() + "\n")
        f.write(format_rows(rows) + "\n\n")


def run_once(benchmark, fn):
    """Run ``fn`` once under pytest-benchmark and return its result."""
    return benchmark.pedantic(fn, rounds=1, iterations=1)
