"""Table 7 — DeepMatcher-lite end model on SIMPLE-EM labels vs ground truth.

Run: ``spark-submit jobs/table7_end_model.py [scale]`` (scale defaults to 1.0).
"""
import sys

from _session import get_spark

from repro.experiments import table7


def main() -> None:
    scale = float(sys.argv[1]) if len(sys.argv) > 1 else 1.0
    spark = get_spark("table7_end_model")
    out = table7.run(spark, scale=scale)
    if isinstance(out, tuple):
        for frame in out:
            print(frame.to_string(index=False))
            print()
    else:
        print(out.to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
