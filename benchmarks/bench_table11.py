"""Benchmark: Table 11 — LF sensitivity sweep.

One full harness run at ``REPRO_BENCH_SCALE`` (default 0.6); the result
table is written to ``results/table11.csv`` and printed into the bench log.
"""
from benchmarks._util import BENCH_SCALE, save_and_show

from repro.experiments import table11


def test_table11(
    spark, benchmark
):
    out = benchmark.pedantic(
        lambda: table11.run(spark, **dict(scale=BENCH_SCALE, datasets=["FZ", "DA", "AB", "AG", "M"])),
        rounds=1,
        iterations=1,
    )
    if isinstance(out, tuple):
        for i, frame in enumerate(out):
            save_and_show(f"table11_{i}", frame)
    else:
        save_and_show("table11", out)
