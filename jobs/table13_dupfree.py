"""Table 13 — duplicate-free detection on two-table datasets.

Run: ``spark-submit jobs/table13_dupfree.py [scale]`` (scale defaults to 1.0).
"""
import sys

from _session import get_spark

from repro.experiments import table13


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_spark("table13_dupfree")
    out = table13.run(spark, scale=scale)
    if isinstance(out, tuple):
        for frame in out:
            print(frame.to_string(index=False))
            print()
    else:
        print(out.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
