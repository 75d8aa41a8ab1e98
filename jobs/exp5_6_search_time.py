"""Experiments 5/6: search time vs answer size (per repository).

Run: spark-submit jobs/exp5_6_search_time.py --repo synthetic|real
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
    parser.set_defaults(targets=5)
    args = parser.parse_args()

    spark = session("exp5_6")
    repo = harness.build_repo(spark, args.repo, **scale_overrides(args))
    targets = harness.pick_targets(repo.lake, args.targets)
    ks = [5, 10, 20]

    d3l = D3L.build(spark, repo.cells)
    d3l.materialize()
    tus = TUS.build(spark, repo.cells)
    tus.materialize()
    aurum = Aurum.build(spark, repo.cells)

    rows = []
    for name, system in [("d3l", d3l), ("tus", tus)]:
        for r in harness.time_search(system, targets, ks):
            rows.append({"system": name, **{k: round(v, 3) if isinstance(v, float) else v for k, v in r.items()}})
    # Aurum's query model is k-independent (graph prebuilt): single scalar.
    aurum_rows = harness.time_search(aurum, targets, [max(ks)])
    rows.append({"system": "aurum (k-independent)", "k": max(ks), "seconds": round(aurum_rows[0]["seconds"], 3)})

    exp = "5 (Synthetic)" if args.repo == "synthetic" else "6 (Smaller Real)"
    harness.print_rows(rows, f"Experiment {exp} — mean per-target search time")
    spark.stop()


if __name__ == "__main__":
    main()
