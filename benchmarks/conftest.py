"""Benchmark fixtures: cached datasets at benchmark scale (~100 MB
class) and a warmed Spark session, so pytest-benchmark timings measure
query execution, not JVM/worker startup."""
from __future__ import annotations

import pytest

from repro.core import Rumble
from repro.workloads import experiments as X

#: Benchmark scales (≈ SF 0.1-class inputs; the paper's full datasets
#: are 16 M–21.6 B objects — see EXPERIMENTS.md for the mapping).
N_CONFUSION = 100_000
N_REDDIT = 400_000
T3_BASE = 20_000
T3_FACTOR = 20


@pytest.fixture(scope="session")
def workdir(tmp_path_factory) -> str:
    return str(tmp_path_factory.mktemp("bench-data"))


@pytest.fixture(scope="session")
def confusion_100k(workdir) -> str:
    return X.confusion_file(workdir, N_CONFUSION)


@pytest.fixture(scope="session")
def confusion_t3_base(workdir) -> str:
    return X.confusion_file(workdir, T3_BASE)


@pytest.fixture(scope="session")
def reddit_400k(workdir) -> str:
    return X.reddit_file(workdir, N_REDDIT)


@pytest.fixture(scope="session")
def warm_spark(spark, confusion_100k):
    """Run one query per system so JVM code paths, Python workers and
    the OS page cache are warm before any timed round."""
    for system in X.SYSTEMS:
        X.runners_for(system, spark, confusion_100k)["filter"]()
    return spark


def run_cell(benchmark, thunk, *, rounds: int = 3):
    """One benchmark cell: fixed rounds, no calibration runs (Spark
    queries are seconds-scale; pytest-benchmark's auto-calibration
    would multiply the runtime budget)."""
    return benchmark.pedantic(thunk, rounds=rounds, iterations=1, warmup_rounds=0)
