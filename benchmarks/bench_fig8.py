"""Fig. 8 benchmark: one scaling point (uniprot 5k edges) of the
Dist-μ-RA vs BigDatalog sweep, on the largest-closure query Q43."""
import pytest

from repro.baselines.bigdatalog import eval_crpq_bigdatalog
from repro.bench.suites import _dist, uniprot_bundle
from repro.core.paper_queries import UNIPROT_QUERIES
from repro.core.rpq import parse_query

Q = parse_query(UNIPROT_QUERIES["Q26"])


@pytest.fixture(scope="module")
def uniprot5k(spark):
    return uniprot_bundle(spark, 5_000)


@pytest.mark.benchmark(group="fig8")
def test_dist_mura_5k(benchmark, spark, uniprot5k):
    tri, consts, gdf, stats = uniprot5k
    run = lambda: _dist(spark, gdf, stats, Q, consts).count()
    assert benchmark.pedantic(run, rounds=1, iterations=1) >= 0


@pytest.mark.benchmark(group="fig8")
def test_bigdatalog_5k(benchmark, spark, uniprot5k):
    tri, consts, gdf, stats = uniprot5k
    run = lambda: eval_crpq_bigdatalog(spark, gdf, Q, consts).count()
    assert benchmark.pedantic(run, rounds=1, iterations=1) >= 0
