"""Benchmark: Table 7 — end model on weak vs GT labels.

One full harness run at ``REPRO_BENCH_SCALE`` (default 0.6); the result
table is written to ``results/table7.csv`` and printed into the bench log.
"""
from benchmarks._util import BENCH_SCALE, save_and_show

from repro.experiments import table7


def test_table7(
    spark, benchmark
):
    out = benchmark.pedantic(
        lambda: table7.run(spark, **dict(scale=BENCH_SCALE)),
        rounds=1,
        iterations=1,
    )
    if isinstance(out, tuple):
        for i, frame in enumerate(out):
            save_and_show(f"table7_{i}", frame)
    else:
        save_and_show("table7", out)
