"""Benchmark: Table 13 — duplicate-free detection.

One full harness run at ``REPRO_BENCH_SCALE`` (default 0.6); the result
table is written to ``results/table13.csv`` and printed into the bench log.
"""
from benchmarks._util import BENCH_SCALE, save_and_show

from repro.experiments import table13


def test_table13(
    spark, benchmark
):
    out = benchmark.pedantic(
        lambda: table13.run(spark, **dict(scale=BENCH_SCALE)),
        rounds=1,
        iterations=1,
    )
    if isinstance(out, tuple):
        for i, frame in enumerate(out):
            save_and_show(f"table13_{i}", frame)
    else:
        save_and_show("table13", out)
