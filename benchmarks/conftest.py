"""Shared benchmark fixtures: medium-scale repositories and prebuilt systems.

Benchmarks print the paper-style result rows (captured into
bench_output.txt) in addition to timing the underlying computation.
"""
import os

import pytest

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")

# Keep bench_output.txt readable: no console progress bars (the JVM has not
# launched yet — the session fixture is lazy).
_args = os.environ.get("PYSPARK_SUBMIT_ARGS", "")
if _args and "showConsoleProgress" not in _args:
    os.environ["PYSPARK_SUBMIT_ARGS"] = _args.replace(
        "pyspark-shell", "--conf spark.ui.showConsoleProgress=false pyspark-shell"
    )

from repro.baselines.aurum import Aurum  # noqa: E402
from repro.baselines.tus import TUS  # noqa: E402
from repro.core.ranking import D3L  # noqa: E402
from repro.eval import harness  # noqa: E402

#: Benchmark scale (paper: 700-43k tables; local session: see DESIGN.md §6).
DERIVATIONS = 5
ROWS = 80
N_TARGETS = 8
KS = [2, 3, 5, 10, 20]


@pytest.fixture(scope="session")
def synthetic_repo(spark):
    return harness.build_repo(
        spark, "synthetic", derivations_per_base=DERIVATIONS, rows=ROWS
    )


@pytest.fixture(scope="session")
def real_repo(spark):
    return harness.build_repo(spark, "real", derivations_per_base=DERIVATIONS, rows=ROWS)


def _systems(spark, repo):
    d3l = D3L.build(spark, repo.cells)
    d3l.materialize()
    tus = TUS.build(spark, repo.cells)
    tus.materialize()
    aurum = Aurum.build(spark, repo.cells)
    return {"d3l": d3l, "tus": tus, "aurum": aurum}


@pytest.fixture(scope="session")
def synthetic_systems(spark, synthetic_repo):
    return _systems(spark, synthetic_repo)


@pytest.fixture(scope="session")
def real_systems(spark, real_repo):
    return _systems(spark, real_repo)


@pytest.fixture(scope="session")
def synthetic_targets(synthetic_repo):
    return harness.pick_targets(synthetic_repo.lake, N_TARGETS)


@pytest.fixture(scope="session")
def real_targets(real_repo):
    return harness.pick_targets(real_repo.lake, N_TARGETS)
