"""Benchmark: Table 2 — LF suite statistics.

One full harness run at ``REPRO_BENCH_SCALE`` (default 0.6); the result
table is written to ``results/table2.csv`` and printed into the bench log.
"""
from benchmarks._util import BENCH_SCALE, save_and_show

from repro.experiments import table2


def test_table2(
    benchmark
):
    out = benchmark.pedantic(
        lambda: table2.run(**dict()),
        rounds=1,
        iterations=1,
    )
    if isinstance(out, tuple):
        for i, frame in enumerate(out):
            save_and_show(f"table2_{i}", frame)
    else:
        save_and_show("table2", out)
