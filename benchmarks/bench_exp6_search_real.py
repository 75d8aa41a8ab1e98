"""Experiment 6: search time vs answer size (Smaller Real)."""
from repro.eval import harness

KS_TIME = [5, 10, 20]


def test_exp6_search_time_real(benchmark, real_systems, real_targets):
    targets = real_targets[:4]

    def run():
        out = {}
        for name in ("d3l", "tus"):
            out[name] = harness.time_search(real_systems[name], targets, KS_TIME)
        out["aurum"] = harness.time_search(real_systems["aurum"], targets, [max(KS_TIME)])
        return out

    out = benchmark.pedantic(run, rounds=1, iterations=1)
    rows = [
        {"system": name, **{k: round(v, 3) if isinstance(v, float) else v for k, v in r.items()}}
        for name, rws in out.items()
        for r in rws
    ]
    harness.print_rows(rows, "Experiment 6 — search time (Smaller Real, s/target)", save="exp6_search_real")
    # Paper Fig. 6c: the D3L/TUS gap narrows on Smaller Real (more numeric
    # work for D3L, none for TUS) but every query still completes.
    assert all(r["seconds"] > 0 for rws in out.values() for r in rws)
