"""Reproduce Table I: per-pair distances for (T, S2) of Figure 1.

Run: spark-submit jobs/table1_example_distances.py
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import session  # noqa: E402

from repro.eval.table1 import PAPER_TABLE1, reproduce_table1  # noqa: E402


def main() -> None:
    spark = session("table1")
    ours = reproduce_table1(spark)
    print("\n== Paper Table I (hypothetical values) ==")
    print(PAPER_TABLE1.to_string(index=False))
    print("\n== Measured (this reproduction) ==")
    print(ours.round(3).to_string(index=False))
    spark.stop()


if __name__ == "__main__":
    main()
