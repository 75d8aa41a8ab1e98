"""Experiment 4: indexing time as the lake grows (all three systems)."""
from repro.eval import harness
from repro.lake.generator import generate_lake


def test_exp4_indexing_time(benchmark, spark):
    def run():
        rows = []
        for d in (2, 4):
            lake = generate_lake(derivations_per_base=d, rows=70, noise=0.3, seed=23)
            times = harness.time_indexing(spark, lake)
            rows.append(
                {"n_tables": lake.n_tables, "n_attrs": lake.n_attributes, **times}
            )
        return rows

    rows = benchmark.pedantic(run, rounds=1, iterations=1)
    harness.print_rows(
        [{k: (round(v, 2) if isinstance(v, float) else v) for k, v in r.items()} for r in rows],
        "Experiment 4 — indexing time (seconds)",
        save="exp4_indexing_time",
    )
    # Robust in-suite claims only: indexing completes and cost grows with
    # lake size for the graph-materialising baseline (Aurum) — its edge
    # self-join is the superlinear part. The paper's finer timing shapes
    # (the Aurum/D3L crossover; TUS slowest overall) are noise-dominated
    # when this bench runs after six session-cached systems; the standalone
    # job (jobs/exp4_indexing_time.py) shows the crossover cleanly and its
    # isolated-run numbers are what EXPERIMENTS.md records. The paper's
    # TUS-slowest-of-all shape does NOT reproduce at any scale here: its
    # YAGO penalty was I/O against a huge external KB, whereas our KB is an
    # in-memory dict (see EXPERIMENTS.md).
    small, big = rows[0], rows[-1]
    assert big["aurum"] > small["aurum"] * 0.9
    # Every system indexes the larger lake in finite, recorded time.
    assert all(r["d3l"] > 0 and r["tus"] > 0 and r["aurum"] > 0 for r in rows)
