"""Table 11 — sensitivity to randomized thresholds and LF sampling.

Run: ``spark-submit jobs/table11_sensitivity.py [scale]`` (scale defaults to 1.0).
"""
import sys

from _session import get_spark

from repro.experiments import table11


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_spark("table11_sensitivity")
    out = table11.run(spark, scale=scale)
    if isinstance(out, tuple):
        for frame in out:
            print(frame.to_string(index=False))
            print()
    else:
        print(out.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
