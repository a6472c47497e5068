"""Fig. 7 benchmark: P_plw^s (pandas local loops) vs P_plw^pg (DuckDB
local loops) on a Yago query whose fixpoint has a stable column."""
import pytest

from repro.bench.suites import _dist
from repro.core.paper_queries import YAGO_QUERIES
from repro.core.rpq import parse_query


@pytest.mark.benchmark(group="fig7")
@pytest.mark.parametrize("strategy", ["plw_s", "plw_pg"])
@pytest.mark.parametrize("qid", ["Q9", "Q22"])
def test_plw_impl(benchmark, spark, yago5k, qid, strategy):
    tri, consts, gdf, stats = yago5k
    q = parse_query(YAGO_QUERIES[qid])
    run = lambda: _dist(spark, gdf, stats, q, consts, strategy=strategy).count()
    assert benchmark.pedantic(run, rounds=1, iterations=1) >= 0
