"""Benchmark: Table 3 — overall F1 of all labeling methods.

One full harness run at ``REPRO_BENCH_SCALE`` (default 0.6); the result
table is written to ``results/table3.csv`` and printed into the bench log.
"""
from benchmarks._util import BENCH_SCALE, save_and_show

from repro.experiments import table3


def test_table3(
    spark, benchmark
):
    out = benchmark.pedantic(
        lambda: table3.run(spark, **dict(scale=BENCH_SCALE)),
        rounds=1,
        iterations=1,
    )
    if isinstance(out, tuple):
        for i, frame in enumerate(out):
            save_and_show(f"table3_{i}", frame)
    else:
        save_and_show("table3", out)
