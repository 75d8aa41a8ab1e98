"""Reproduce Table II (Experiment 7): index space overhead vs lake size.

Run: spark-submit jobs/table2_space_overhead.py [--workdir DIR]
"""
import argparse
import sys
import tempfile
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import session  # noqa: E402

from repro.eval import harness  # noqa: E402
from repro.lake.generator import generate_lake  # noqa: E402


def main() -> None:
    parser = argparse.ArgumentParser()
    parser.add_argument("--workdir", default=None)
    parser.add_argument("--derivations", type=int, default=4)
    parser.add_argument("--rows", type=int, default=90)
    args = parser.parse_args()
    workdir = args.workdir or tempfile.mkdtemp(prefix="space_overhead_")

    spark = session("table2")
    rows = []
    for label, preset in [
        ("Synthetic", dict(noise=0.0, seed=21)),
        ("Smaller Real", dict(noise=0.6, seed=22)),
        ("Larger Real (sample)", dict(noise=0.3, seed=23)),
    ]:
        lake = generate_lake(
            derivations_per_base=args.derivations, rows=args.rows, **preset
        )
        r = harness.space_overhead(spark, lake, f"{workdir}/{label.split()[0].lower()}")
        rows.append({"repository": label, **{k: round(v, 3) for k, v in r.items()}})
    harness.print_rows(rows, "Table II — space overhead (index bytes / lake CSV bytes)")
    print(
        "\nPaper Table II: D3L 69%/33%/58%, TUS 56%/19%/32%, Aurum 55%/20%/29%"
        " (Synthetic / Smaller Real / Larger Real sample)"
    )
    spark.stop()


if __name__ == "__main__":
    main()
