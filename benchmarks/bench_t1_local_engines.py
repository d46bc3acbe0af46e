"""T1 benchmark (paper Fig. 11): local execution of the three paper
queries on the confusion dataset, one cell per (system, query).

Regenerate the full table with ``spark-submit jobs/table1_local.py``;
this bench pins the 100 k-object scale for regression tracking.
"""
import pytest

from benchmarks.conftest import run_cell
from repro.workloads import experiments as X

CELLS = [(s, q) for s in X.SYSTEMS for q in ("filter", "group", "sort")]


@pytest.mark.parametrize("system,query", CELLS, ids=[f"{s}-{q}" for s, q in CELLS])
@pytest.mark.benchmark(group="t1-local-100k")
def test_t1_cell(benchmark, warm_spark, confusion_100k, system, query):
    runner = X.runners_for(system, warm_spark, confusion_100k)[query]
    result = run_cell(benchmark, runner)
    assert result is not None
