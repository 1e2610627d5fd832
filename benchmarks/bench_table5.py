"""Benchmark: Table 5 — SIMPLE-EM vs active learning.

One full harness run at ``REPRO_BENCH_SCALE`` (default 0.6); the result
table is written to ``results/table5.csv`` and printed into the bench log.
"""
from benchmarks._util import BENCH_SCALE, save_and_show

from repro.experiments import table5


def test_table5(
    spark, benchmark
):
    out = benchmark.pedantic(
        lambda: table5.run(spark, **dict(scale=BENCH_SCALE, max_labels=600)),
        rounds=1,
        iterations=1,
    )
    if isinstance(out, tuple):
        for i, frame in enumerate(out):
            save_and_show(f"table5_{i}", frame)
    else:
        save_and_show("table5", out)
