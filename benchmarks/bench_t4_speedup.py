"""T4 benchmark (paper Fig. 14): the highly filtering Reddit query at
increasing degrees of parallelism (input partitions stand in for the
paper's executor count — DESIGN.md §4). Speedup = t(p=1) / t(p).
"""
import pytest

from benchmarks.conftest import run_cell
from repro.core import Rumble
from repro.workloads import queries as Q

PARTITIONS = (1, 2, 4, 8, 16)


@pytest.mark.parametrize("p", PARTITIONS)
@pytest.mark.benchmark(group="t4-speedup-reddit")
def test_t4_partitions(benchmark, warm_spark, reddit_400k, p):
    eng = Rumble(warm_spark)
    q = Q.jsoniq_reddit_filter(reddit_400k, partitions=p)
    eng.run_one(q)  # warm this partition layout once
    n = run_cell(benchmark, lambda: eng.run_one(q))
    assert n > 0
