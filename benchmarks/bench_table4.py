"""Benchmark: Table 4 — SIMPLE-EM vs Ditto-lite.

One full harness run at ``REPRO_BENCH_SCALE`` (default 0.6); the result
table is written to ``results/table4.csv`` and printed into the bench log.
"""
from benchmarks._util import BENCH_SCALE, save_and_show

from repro.experiments import table4


def test_table4(
    spark, benchmark
):
    out = benchmark.pedantic(
        lambda: table4.run(spark, **dict(scale=BENCH_SCALE, max_pairs=8000)),
        rounds=1,
        iterations=1,
    )
    if isinstance(out, tuple):
        for i, frame in enumerate(out):
            save_and_show(f"table4_{i}", frame)
    else:
        save_and_show("table4", out)
