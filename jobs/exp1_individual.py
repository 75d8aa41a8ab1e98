"""Experiment 1: per-evidence vs combined precision/recall (Smaller Real).

Run: spark-submit jobs/exp1_individual.py [--targets N]
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _common import repo_arg, scale_args, scale_overrides, session  # noqa: E402

from repro.core.ranking import D3L  # noqa: E402
from repro.eval import harness  # noqa: E402


def main() -> None:
    parser = argparse.ArgumentParser()
    repo_arg(parser)
    scale_args(parser)
    parser.set_defaults(repo="real")
    args = parser.parse_args()

    spark = session("exp1")
    repo = harness.build_repo(spark, args.repo, **scale_overrides(args))
    targets = harness.pick_targets(repo.lake, args.targets)
    d3l = D3L.build(spark, repo.cells)
    d3l.materialize()
    ks = [2, 3, 5, 10, 20]
    rows = harness.run_individual_effectiveness(d3l, repo.lake, targets, ks)
    harness.print_rows(rows, f"Experiment 1 — individual effectiveness ({args.repo})")
    spark.stop()


if __name__ == "__main__":
    main()
