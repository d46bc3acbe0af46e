"""T2 benchmark (paper Fig. 12): Rumble vs the single-threaded JSONiq
engines (Zorba-like streaming, Xidel-like naive) on the confusion
dataset at 100 k objects. At this size all engines finish — the DNF
crossovers at larger scales are produced by
``spark-submit jobs/table2_jsoniq_engines.py``.
"""
import pytest

from benchmarks.conftest import run_cell
from repro.baselines import local_single_thread as L
from repro.core import Rumble
from repro.workloads import queries as Q

QUERIES = {
    "filter": Q.jsoniq_filter,
    "group": Q.jsoniq_group,
    "sort": Q.jsoniq_sort,
}


def _cap(query: str) -> int | None:
    return 10 if query == "sort" else None


@pytest.mark.parametrize("query", list(QUERIES))
@pytest.mark.benchmark(group="t2-jsoniq-engines-100k")
def test_t2_rumble(benchmark, warm_spark, confusion_100k, query):
    q = QUERIES[query](confusion_100k)
    eng = Rumble(warm_spark)
    run_cell(benchmark, lambda: eng.run(q, _cap(query)))


@pytest.mark.parametrize("query", list(QUERIES))
@pytest.mark.benchmark(group="t2-jsoniq-engines-100k")
def test_t2_zorba_like(benchmark, confusion_100k, query):
    q = QUERIES[query](confusion_100k)
    run_cell(benchmark, lambda: L.zorba_like(q, cap=_cap(query)), rounds=1)


@pytest.mark.parametrize("query", list(QUERIES))
@pytest.mark.benchmark(group="t2-jsoniq-engines-100k")
def test_t2_xidel_like(benchmark, confusion_100k, query):
    q = QUERIES[query](confusion_100k)
    run_cell(benchmark, lambda: L.xidel_like(q, cap=_cap(query)), rounds=1)
