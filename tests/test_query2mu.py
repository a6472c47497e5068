"""Naive Query2Mu translation: schema correctness and agreement with the
reference evaluator (the translation must be correct *before* any
rewriting; optimizers are tested elsewhere)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.compiler_pandas import eval_pandas
from repro.core.query2mu import (
    GRAPH,
    GRAPH_SCHEMA,
    crpq_to_term,
    label_term,
    rx_to_term,
)
from repro.core.reference import eval_crpq, eval_rx_pairs
from repro.core.rpq import parse_query, parse_rx
from repro.core.terms import schema


@pytest.fixture(scope="module")
def tri():
    g = np.random.default_rng(4)
    return pd.DataFrame(
        {
            "src": g.integers(0, 40, 160),
            "label": g.choice(["a", "b", "c"], 160),
            "dst": g.integers(0, 40, 160),
        }
    ).drop_duplicates(ignore_index=True)


@pytest.fixture(scope="module")
def triples(tri):
    return [(int(s), str(l), int(d)) for s, l, d in tri.itertuples(index=False)]


RXES = ["a", "-a", "a/b", "a+", "(a/b)+", "(a|b)", "(a|b)+", "a+/b+", "-a/b", "(a/-a)+"]


@pytest.mark.parametrize("rx", RXES)
def test_rx_term_schema_is_binary(rx):
    t = rx_to_term(parse_rx(rx))
    assert schema(t, GRAPH_SCHEMA) == frozenset({"src", "dst"})


@pytest.mark.parametrize("rx", RXES)
def test_rx_term_matches_reference(rx, tri, triples):
    t = rx_to_term(parse_rx(rx))
    out = eval_pandas(t, {GRAPH: tri})
    got = set(map(tuple, out[["src", "dst"]].values.tolist()))
    assert got == eval_rx_pairs(parse_rx(rx), triples)


QUERIES = [
    "?x, ?y <- ?x a+ ?y",
    "?x <- ?x a+ 3",
    "?x <- 3 a+ ?x",
    "?y <- ?x a/b ?y",
    "?x <- ?x a ?x",
    "?x, ?z <- ?x a+ ?y, ?y b ?z",
]


@pytest.mark.parametrize("query", QUERIES)
def test_crpq_translation_matches_reference(query, tri, triples):
    q = parse_query(query)
    out = eval_pandas(crpq_to_term(q), {GRAPH: tri})
    cols = ["v_" + h[1:] for h in q.head]
    got = set(map(tuple, out[cols].values.tolist()))
    assert got == eval_crpq(q, triples)


def test_label_term_filters(tri):
    out = eval_pandas(label_term("a"), {GRAPH: tri})
    expected = tri[tri.label == "a"][["src", "dst"]].drop_duplicates()
    assert len(out) == len(expected)


def test_label_term_inverse(tri):
    out = eval_pandas(label_term("a", inv=True), {GRAPH: tri})
    expected = {(int(d), int(s)) for s, l, d in tri.itertuples(index=False) if l == "a"}
    assert set(map(tuple, out[["src", "dst"]].values.tolist())) == expected


def test_unknown_constant_raises():
    with pytest.raises(KeyError, match="unknown constant"):
        crpq_to_term(parse_query("?x <- ?x a+ Japan"))


def test_constant_resolution_by_name(tri, triples):
    c = triples[0][2]
    q = parse_query("?x <- ?x a+ Target")
    t = crpq_to_term(q, {"Target": c})
    out = eval_pandas(t, {GRAPH: tri})
    got = set(map(tuple, out[["v_x"]].values.tolist()))
    assert got == eval_crpq(q, triples, {"Target": c})
