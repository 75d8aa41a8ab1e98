"""Experiment 2: comparative effectiveness on the Synthetic repository."""
from benchmarks.conftest import KS
from repro.eval import harness


def test_exp2_effectiveness_synthetic(
    benchmark, synthetic_repo, synthetic_systems, synthetic_targets
):
    rows = benchmark.pedantic(
        lambda: harness.run_comparative_effectiveness(
            synthetic_systems, synthetic_repo.lake, synthetic_targets, KS
        ),
        rounds=1,
        iterations=1,
    )
    harness.print_rows(rows, "Experiment 2 — effectiveness (Synthetic)", save="exp2_effectiveness_synthetic")

    by = {(r["system"], r["k"]): r for r in rows}
    k_head = KS[0]
    # Paper Fig. 4: D3L is the most precise system at the head of the
    # ranking and never loses to TUS.
    assert by[("d3l", k_head)]["precision"] >= by[("tus", k_head)]["precision"]
    assert by[("d3l", k_head)]["precision"] >= by[("aurum", k_head)]["precision"]
    # Recall at the tail: D3L finds at least as much as TUS (Fig. 4b).
    k_tail = KS[-1]
    assert by[("d3l", k_tail)]["recall"] >= by[("tus", k_tail)]["recall"] - 0.05
