"""T3 benchmark (paper Fig. 13): the 'cluster' configuration — the
confusion dataset replicated 20× via comma paths (400 k objects total
here; the paper's was 320 M on 9 nodes), all four systems, three
queries, on all 16 local cores.
"""
import pytest

from benchmarks.conftest import T3_FACTOR, run_cell
from repro import synth_data
from repro.workloads import experiments as X

CELLS = [(s, q) for s in X.SYSTEMS for q in ("filter", "group", "sort")]


@pytest.mark.parametrize("system,query", CELLS, ids=[f"{s}-{q}" for s, q in CELLS])
@pytest.mark.benchmark(group="t3-cluster-20x")
def test_t3_cell(benchmark, warm_spark, confusion_t3_base, system, query):
    path = synth_data.replicated_path(confusion_t3_base, T3_FACTOR)
    runner = X.runners_for(system, warm_spark, path)[query]
    result = run_cell(benchmark, runner)
    assert result is not None
