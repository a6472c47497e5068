"""Fig. 13 benchmark: a C6 uniprot query (Q33) across the three
distributed systems."""
import pytest

from repro.baselines.bigdatalog import eval_crpq_bigdatalog
from repro.baselines.pregel import CapacityError, eval_crpq_pregel
from repro.bench.suites import _dist
from repro.core.paper_queries import UNIPROT_QUERIES
from repro.core.rpq import parse_query

Q = parse_query(UNIPROT_QUERIES["Q33"])


@pytest.mark.benchmark(group="fig13")
def test_dist_mura(benchmark, spark, uniprot3k):
    tri, consts, gdf, stats = uniprot3k
    run = lambda: _dist(spark, gdf, stats, Q, consts).count()
    assert benchmark.pedantic(run, rounds=1, iterations=1) >= 0


@pytest.mark.benchmark(group="fig13")
def test_bigdatalog(benchmark, spark, uniprot3k):
    tri, consts, gdf, stats = uniprot3k
    run = lambda: eval_crpq_bigdatalog(spark, gdf, Q, consts).count()
    assert benchmark.pedantic(run, rounds=1, iterations=1) >= 0


@pytest.mark.benchmark(group="fig13")
def test_graphx(benchmark, spark, uniprot3k):
    tri, consts, gdf, stats = uniprot3k

    def run():
        try:
            return eval_crpq_pregel(spark, gdf, Q, consts, max_rows=2_000_000).count()
        except CapacityError:
            return -1  # the paper's "crashed" marker

    assert benchmark.pedantic(run, rounds=1, iterations=1) >= -1
