"""Shared test fixtures: small deterministic graphs.

The session-scoped ``spark`` fixture comes from the repo-root
conftest.py. Everything here is sized for unit tests (SF≈0.01-grade:
tens of nodes, hundreds of edges) so Spark fixpoints take seconds.
"""
from __future__ import annotations

import pandas as pd
import pytest

from repro.graphs.generators import add_labels, erdos_renyi, random_tree

# The paper's Fig. 2 example graph: E edges, S starting edges, and the
# expected fixpoint of Example 2 (computed by hand in the paper).
FIG2_E = pd.DataFrame(
    {
        "src": [1, 1, 10, 10, 2, 4, 11, 13, 3, 5],
        "dst": [2, 4, 11, 13, 3, 5, 5, 12, 6, 6],
    }
)
FIG2_S = pd.DataFrame({"src": [1, 1, 10, 10], "dst": [2, 4, 11, 13]})
FIG2_FIXPOINT = sorted(
    [
        (1, 2), (1, 4), (10, 11), (10, 13),  # X1 = S
        (1, 3), (1, 5), (10, 5), (10, 12),   # X2
        (1, 6), (10, 6),                     # X3
    ]
)


@pytest.fixture(scope="session")
def fig2_e() -> pd.DataFrame:
    return FIG2_E.copy()


@pytest.fixture(scope="session")
def fig2_s() -> pd.DataFrame:
    return FIG2_S.copy()


@pytest.fixture(scope="session")
def small_triples() -> pd.DataFrame:
    """~200 labeled edges over 60 nodes, labels a/b/c."""
    return add_labels(erdos_renyi(60, 0.06, seed=5), ["a", "b", "c"], seed=6)


@pytest.fixture(scope="session")
def small_triples_list(small_triples) -> list[tuple[int, str, int]]:
    return [
        (int(s), str(l), int(d)) for s, l, d in small_triples.itertuples(index=False)
    ]


@pytest.fixture(scope="session")
def tiny_tree() -> pd.DataFrame:
    return random_tree(120, seed=3)


@pytest.fixture(scope="session")
def spark_triples(spark, small_triples):
    return spark.createDataFrame(small_triples).cache()


def triples_of(pdf: pd.DataFrame) -> list[tuple[int, str, int]]:
    return [(int(s), str(l), int(d)) for s, l, d in pdf.itertuples(index=False)]
