"""Fig. 10 benchmark: a 3-closure concatenation (class C6) — merged
fixpoint (Dist-μ-RA) vs full-closure chaining (BigDatalog-like)."""
import pytest

from repro.baselines.bigdatalog import eval_crpq_bigdatalog
from repro.bench.suites import _dist, concat_query
from repro.core.rpq import parse_query

Q = parse_query(concat_query(3))


@pytest.mark.benchmark(group="fig10")
def test_dist_mura_merged(benchmark, spark, concat300):
    tri, gdf, stats = concat300
    run = lambda: _dist(spark, gdf, stats, Q, {}).count()
    assert benchmark.pedantic(run, rounds=1, iterations=1) >= 0


@pytest.mark.benchmark(group="fig10")
def test_bigdatalog_chained(benchmark, spark, concat300):
    tri, gdf, stats = concat300
    run = lambda: eval_crpq_bigdatalog(spark, gdf, Q).count()
    assert benchmark.pedantic(run, rounds=1, iterations=1) >= 0
