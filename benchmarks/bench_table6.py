"""Benchmark: Table 6 — running time of all methods.

One full harness run at ``REPRO_BENCH_SCALE`` (default 0.6); the result
table is written to ``results/table6.csv`` and printed into the bench log.
"""
from benchmarks._util import BENCH_SCALE, save_and_show

from repro.experiments import table6


def test_table6(
    spark, benchmark
):
    out = benchmark.pedantic(
        lambda: table6.run(spark, **dict(scale=BENCH_SCALE)),
        rounds=1,
        iterations=1,
    )
    if isinstance(out, tuple):
        for i, frame in enumerate(out):
            save_and_show(f"table6_{i}", frame)
    else:
        save_and_show("table6", out)
