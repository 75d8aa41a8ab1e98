"""Experiment 1: per-evidence vs combined effectiveness (Smaller Real)."""
from benchmarks.conftest import KS
from repro.eval import harness


def test_exp1_individual_effectiveness(benchmark, real_repo, real_systems, real_targets):
    d3l = real_systems["d3l"]

    rows = benchmark.pedantic(
        lambda: harness.run_individual_effectiveness(
            d3l, real_repo.lake, real_targets, KS
        ),
        rounds=1,
        iterations=1,
    )
    harness.print_rows(rows, "Experiment 1 — individual vs combined (Smaller Real)", save="exp1_individual_real")

    by = {(r["evidence"], r["k"]): r for r in rows}
    k_mid = KS[2]
    # Paper Fig. 3: format is the weakest signal; the combined aggregation
    # beats or matches it everywhere.
    assert by[("combined", k_mid)]["precision"] >= by[("f", k_mid)]["precision"]
    # The combined ranking is competitive with the best single evidence.
    best_single = max(
        by[(e, k_mid)]["precision"] for e in ["n", "v", "f", "e"]
    )
    assert by[("combined", k_mid)]["precision"] >= best_single - 0.15
