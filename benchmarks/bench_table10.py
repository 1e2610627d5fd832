"""Benchmark: Table 10 — data-shift saved effort.

One full harness run at ``REPRO_BENCH_SCALE`` (default 0.6); the result
table is written to ``results/table10.csv`` and printed into the bench log.
"""
from benchmarks._util import BENCH_SCALE, save_and_show

from repro.experiments import table10


def test_table10(
    spark, benchmark
):
    out = benchmark.pedantic(
        lambda: table10.run(spark, **dict(scale=BENCH_SCALE, max_labels=500)),
        rounds=1,
        iterations=1,
    )
    if isinstance(out, tuple):
        for i, frame in enumerate(out):
            save_and_show(f"table10_{i}", frame)
    else:
        save_and_show("table10", out)
