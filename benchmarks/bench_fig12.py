"""Fig. 12 benchmark: Myria vs Dist-μ-RA on same generation."""
import pytest

from repro.baselines.myria import eval_term_myria
from repro.bench.suites import _term_on_spark
from repro.core.queries import same_generation_term

SG = same_generation_term("G")


@pytest.mark.benchmark(group="fig12")
def test_dist(benchmark, spark, tree800_parent):
    run = lambda: _term_on_spark(spark, SG, {"G": tree800_parent}).count()
    assert benchmark.pedantic(run, rounds=1, iterations=1) > 0


@pytest.mark.benchmark(group="fig12")
def test_myria(benchmark, tree800_parent):
    run = lambda: len(eval_term_myria(SG, tree800_parent))
    assert benchmark.pedantic(run, rounds=1, iterations=1) > 0
