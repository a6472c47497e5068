"""Fig. 11 benchmark: μ-RA terms — same-generation (P_gld territory) and
reach (P_plw with pushed antiprojection)."""
import pytest

from repro.baselines.myria import eval_term_myria
from repro.bench.suites import _term_on_spark
from repro.core.queries import reach_term, same_generation_term
from repro.core.rewriter import rewrite
from repro.graphs.generators import erdos_renyi

SG = same_generation_term("G")


@pytest.mark.benchmark(group="fig11")
def test_same_gen_dist(benchmark, spark, tree800_parent):
    run = lambda: _term_on_spark(spark, SG, {"G": tree800_parent}).count()
    assert benchmark.pedantic(run, rounds=1, iterations=1) > 0


@pytest.mark.benchmark(group="fig11")
def test_same_gen_myria(benchmark, tree800_parent):
    run = lambda: len(eval_term_myria(SG, tree800_parent))
    assert benchmark.pedantic(run, rounds=1, iterations=1) > 0


@pytest.mark.benchmark(group="fig11")
def test_reach_dist(benchmark, spark):
    e = erdos_renyi(800, 0.01, seed=1)
    src = int(e["src"].mode().iloc[0])
    term = rewrite(reach_term(src, "G"), {"G": frozenset({"src", "dst"})})
    run = lambda: _term_on_spark(spark, term, {"G": e}).count()
    assert benchmark.pedantic(run, rounds=1, iterations=1) >= 0
