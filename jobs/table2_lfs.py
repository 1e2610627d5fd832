"""Table 2 — labeling-function development effort (suite sizes, #new LFs).

Run: ``python jobs/table2_lfs.py`` (no Spark needed for this table).
"""
from repro.experiments import table2


def main() -> None:
    print(table2.run().to_string(index=False))


if __name__ == "__main__":
    main()
