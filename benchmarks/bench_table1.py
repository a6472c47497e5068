"""Table I benchmarks: exact TC-size computation on the scaled datasets
(the quantity the paper's Table I reports per synthetic graph)."""
import pytest

from repro.graphs.generators import erdos_renyi, random_tree
from repro.graphs.stats import tc_size


@pytest.mark.benchmark(group="table1")
def test_tc_size_rnd_1k(benchmark):
    e = erdos_renyi(1_000, 0.01, seed=1)
    out = benchmark.pedantic(lambda: tc_size(e), rounds=1, iterations=1)
    assert out > 10_000


@pytest.mark.benchmark(group="table1")
def test_tc_size_tree_15k(benchmark):
    t = random_tree(15_000, seed=7)
    out = benchmark.pedantic(lambda: tc_size(t), rounds=1, iterations=1)
    assert out > 50_000
