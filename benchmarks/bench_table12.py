"""Benchmark: Table 12 — SIMPLE on WRENCH-style tasks.

One full harness run at ``REPRO_BENCH_SCALE`` (default 0.6); the result
table is written to ``results/table12.csv`` and printed into the bench log.
"""
from benchmarks._util import BENCH_SCALE, save_and_show

from repro.experiments import table12


def test_table12(
    benchmark
):
    out = benchmark.pedantic(
        lambda: table12.run(**dict()),
        rounds=1,
        iterations=1,
    )
    if isinstance(out, tuple):
        for i, frame in enumerate(out):
            save_and_show(f"table12_{i}", frame)
    else:
        save_and_show("table12", out)
