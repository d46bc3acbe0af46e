"""T5 benchmark (paper Fig. 15): runtime of the Reddit filter query as
the dataset is replicated — the scaled version of the paper's 400× /
12 TB sweep. The runtime should grow linearly with the factor.
"""
import pytest

from benchmarks.conftest import run_cell
from repro import synth_data
from repro.core import Rumble
from repro.workloads import queries as Q

FACTORS = (1, 2, 4, 8)


@pytest.mark.parametrize("factor", FACTORS)
@pytest.mark.benchmark(group="t5-scaling-reddit")
def test_t5_factor(benchmark, warm_spark, reddit_400k, factor):
    eng = Rumble(warm_spark)
    path = synth_data.replicated_path(reddit_400k, factor)
    q = Q.jsoniq_reddit_filter(path)
    n = run_cell(benchmark, lambda: eng.run_one(q))
    assert n > 0
