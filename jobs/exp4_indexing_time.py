"""Experiment 4: indexing time as the data lake grows.

Run: spark-submit jobs/exp4_indexing_time.py [--steps N]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import session  # noqa: E402

from repro.eval import harness  # noqa: E402
from repro.lake.generator import generate_lake  # noqa: E402


def main() -> None:
    parser = argparse.ArgumentParser()
    parser.add_argument("--steps", type=int, default=4)
    parser.add_argument("--base-derivations", type=int, default=2)
    args = parser.parse_args()

    spark = session("exp4")
    rows = []
    for i in range(1, args.steps + 1):
        d = args.base_derivations * i
        lake = generate_lake(derivations_per_base=d, rows=90, noise=0.3, seed=23)
        times = harness.time_indexing(spark, lake)
        rows.append(
            {
                "n_tables": lake.n_tables,
                "n_attrs": lake.n_attributes,
                **{k: round(v, 2) for k, v in times.items()},
            }
        )
    harness.print_rows(rows, "Experiment 4 — indexing time (seconds)")
    spark.stop()


if __name__ == "__main__":
    main()
