"""Experiments 2/3: P/R of D3L vs TUS vs Aurum as answer size grows.

Run: spark-submit jobs/exp2_3_effectiveness.py --repo synthetic|real
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import repo_arg, scale_args, scale_overrides, session  # noqa: E402

from repro.baselines.aurum import Aurum  # noqa: E402
from repro.baselines.tus import TUS  # noqa: E402
from repro.core.ranking import D3L  # noqa: E402
from repro.eval import harness  # noqa: E402


def main() -> None:
    parser = argparse.ArgumentParser()
    repo_arg(parser)
    scale_args(parser)
    args = parser.parse_args()

    spark = session("exp2_3")
    repo = harness.build_repo(spark, args.repo, **scale_overrides(args))
    targets = harness.pick_targets(repo.lake, args.targets)
    systems = {
        "d3l": D3L.build(spark, repo.cells),
        "tus": TUS.build(spark, repo.cells),
        "aurum": Aurum.build(spark, repo.cells),
    }
    ks = [2, 3, 5, 10, 20]
    rows = harness.run_comparative_effectiveness(systems, repo.lake, targets, ks)
    exp = "2 (Synthetic)" if args.repo == "synthetic" else "3 (Smaller Real)"
    harness.print_rows(rows, f"Experiment {exp} — comparative effectiveness")
    spark.stop()


if __name__ == "__main__":
    main()
