"""Experiments 8-11: target coverage and attribute precision with/without
join-path augmentation (D3L+J vs Aurum+J vs plain systems).

Run: spark-submit jobs/exp8_11_join_impact.py --repo synthetic|real
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
    parser.set_defaults(targets=8)
    args = parser.parse_args()

    spark = session("exp8_11")
    repo = harness.build_repo(spark, args.repo, **scale_overrides(args))
    targets = harness.pick_targets(repo.lake, args.targets)
    d3l = D3L.build(spark, repo.cells)
    tus = TUS.build(spark, repo.cells)
    aurum = Aurum.build(spark, repo.cells)

    rows = harness.run_join_impact(d3l, aurum, tus, repo.lake, targets, ks=[2, 5, 10])
    exps = "8/9 (Synthetic)" if args.repo == "synthetic" else "10/11 (Smaller Real)"
    harness.print_rows(rows, f"Experiments {exps} — coverage & attribute precision")
    spark.stop()


if __name__ == "__main__":
    main()
