"""Experiments 8/9: coverage & attribute precision with joins (Synthetic)."""
from repro.eval import harness

KS_JOIN = [2, 5, 10]


def test_exp8_9_join_impact_synthetic(
    benchmark, synthetic_repo, synthetic_systems, synthetic_targets
):
    rows = benchmark.pedantic(
        lambda: harness.run_join_impact(
            synthetic_systems["d3l"],
            synthetic_systems["aurum"],
            synthetic_systems["tus"],
            synthetic_repo.lake,
            synthetic_targets,
            KS_JOIN,
        ),
        rounds=1,
        iterations=1,
    )
    harness.print_rows(rows, "Experiments 8/9 — join impact (Synthetic)", save="exp8_9_join_synthetic")

    by = {(r["system"], r["k"]): r for r in rows}
    for k in KS_JOIN:
        # Fig. 7a: join paths never reduce coverage.
        assert by[("d3l+j", k)]["coverage"] >= by[("d3l", k)]["coverage"] - 1e-9
        assert by[("aurum+j", k)]["coverage"] >= by[("aurum", k)]["coverage"] - 1e-9
    # Fig. 7b: D3L+J attribute precision does not collapse below D3L's.
    k_tail = KS_JOIN[-1]
    assert (
        by[("d3l+j", k_tail)]["attr_precision"]
        >= by[("d3l", k_tail)]["attr_precision"] - 0.05
    )
