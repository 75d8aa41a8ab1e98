"""Experiments 10/11: coverage & attribute precision with joins (Smaller Real)."""
from repro.eval import harness

KS_JOIN = [2, 5, 10]


def test_exp10_11_join_impact_real(benchmark, real_repo, real_systems, real_targets):
    rows = benchmark.pedantic(
        lambda: harness.run_join_impact(
            real_systems["d3l"],
            real_systems["aurum"],
            real_systems["tus"],
            real_repo.lake,
            real_targets,
            KS_JOIN,
        ),
        rounds=1,
        iterations=1,
    )
    harness.print_rows(rows, "Experiments 10/11 — join impact (Smaller Real)", save="exp10_11_join_real")

    by = {(r["system"], r["k"]): r for r in rows}
    for k in KS_JOIN:
        assert by[("d3l+j", k)]["coverage"] >= by[("d3l", k)]["coverage"] - 1e-9
        assert by[("aurum+j", k)]["coverage"] >= by[("aurum", k)]["coverage"] - 1e-9
    # Fig. 8: D3L covers the target better than TUS across the k range.
    k_mid = KS_JOIN[1]
    assert by[("d3l", k_mid)]["coverage"] >= by[("tus", k_mid)]["coverage"] - 0.05
