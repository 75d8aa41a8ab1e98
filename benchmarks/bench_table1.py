"""Table I: distances for the Figure 1 worked example."""
import sys

from repro.eval.table1 import PAPER_TABLE1, reproduce_table1


def _emit(text):
    print(text, file=sys.__stdout__, flush=True)


def test_table1_example_distances(benchmark, spark):
    result = benchmark.pedantic(lambda: reproduce_table1(spark), rounds=1, iterations=1)
    _emit("\n== Paper Table I (hypothetical) ==")
    _emit(PAPER_TABLE1.to_string(index=False))
    _emit("== Measured Table I ==")
    _emit(result.round(3).to_string(index=False))
    from pathlib import Path
    out = Path(__file__).resolve().parents[1] / "results"
    out.mkdir(exist_ok=True)
    (out / "table1_distances.txt").write_text(
        "Paper Table I (hypothetical)\n" + PAPER_TABLE1.to_string(index=False)
        + "\nMeasured\n" + result.round(3).to_string(index=False) + "\n"
    )
    assert (result["D_n"] <= 1.0).all()
