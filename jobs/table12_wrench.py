"""Table 12 — SIMPLE on general weak-supervision (WRENCH-style) tasks.

Run: ``python jobs/table12_wrench.py`` (no Spark needed for this table).
"""
from repro.experiments import table12


def main() -> None:
    print(table12.run().to_string(index=False))


if __name__ == "__main__":
    main()
