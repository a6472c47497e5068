"""Benchmark fixtures: small-but-nontrivial graph bundles, one per
dataset family, shared across benchmark modules (session scope — the
generation cost is not part of any measurement)."""
from __future__ import annotations

import pytest

from repro.bench.suites import uniprot_bundle, yago_bundle
from repro.graphs.generators import add_labels, erdos_renyi, random_tree


@pytest.fixture(scope="session")
def yago5k(spark):
    return yago_bundle(spark, 5_000)


@pytest.fixture(scope="session")
def uniprot3k(spark):
    return uniprot_bundle(spark, 3_000)


@pytest.fixture(scope="session")
def concat300(spark):
    from repro.bench.suites import concat_graph
    from repro.core.cost import GraphStats

    tri = concat_graph(n_nodes=300)
    gdf = spark.createDataFrame(tri).cache()
    gdf.count()
    return tri, gdf, GraphStats.from_pandas(tri)


@pytest.fixture(scope="session")
def tree800_parent():
    t = random_tree(800, seed=6)
    return t.rename(columns={"src": "dst", "dst": "src"})[["src", "dst"]]
