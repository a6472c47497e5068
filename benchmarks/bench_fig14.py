"""Fig. 14 benchmark: Myria vs Dist-μ-RA on a co-reference closure
(Q43) over uniprot."""
import pytest

from repro.baselines.myria import eval_crpq_myria
from repro.bench.suites import _dist
from repro.core.paper_queries import UNIPROT_QUERIES
from repro.core.rpq import parse_query

Q = parse_query(UNIPROT_QUERIES["Q43"])


@pytest.mark.benchmark(group="fig14")
def test_dist_mura(benchmark, spark, uniprot3k):
    tri, consts, gdf, stats = uniprot3k
    run = lambda: _dist(spark, gdf, stats, Q, consts).count()
    assert benchmark.pedantic(run, rounds=1, iterations=1) >= 0


@pytest.mark.benchmark(group="fig14")
def test_myria(benchmark, uniprot3k):
    tri, consts, gdf, stats = uniprot3k
    run = lambda: len(eval_crpq_myria(tri, Q, consts))
    assert benchmark.pedantic(run, rounds=1, iterations=1) >= 0
