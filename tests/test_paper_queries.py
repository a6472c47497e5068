"""Every paper query (Q1–Q50) planned and executed (pandas backend) on
tiny instances of its dataset, checked against the independent reference
evaluator. Also checks every query has non-empty results at test scale,
so benchmark comparisons measure real work."""
import pytest

from repro.core.compiler_pandas import eval_pandas
from repro.core.cost import GraphStats
from repro.core.paper_queries import (
    UNIPROT_QUERIES,
    YAGO_QUERIES,
    query_classes,
    uniprot_consts,
)
from repro.core.planner import plan_crpq
from repro.core.query2mu import GRAPH
from repro.core.reference import eval_crpq
from repro.core.rpq import parse_query
from repro.graphs.uniprot import uniprot
from repro.graphs.yago import yago_lite


@pytest.fixture(scope="module")
def yago():
    tri, consts = yago_lite(3000, seed=0)
    triples = [(int(s), str(l), int(d)) for s, l, d in tri.itertuples(index=False)]
    return tri, consts, GraphStats.from_pandas(tri), triples


@pytest.fixture(scope="module")
def uni():
    tri, _ = uniprot(2500, seed=0)
    consts = uniprot_consts(tri)
    triples = [(int(s), str(l), int(d)) for s, l, d in tri.itertuples(index=False)]
    return tri, consts, GraphStats.from_pandas(tri), triples


def run(qtext, bundle):
    tri, consts, stats, triples = bundle
    q = parse_query(qtext)
    rep = plan_crpq(q, stats, consts)
    out = eval_pandas(rep.term, {GRAPH: tri})
    cols = ["v_" + h[1:] for h in q.head]
    got = set(map(tuple, out[cols].values.tolist()))
    ref = eval_crpq(q, triples, consts)
    return got, ref


@pytest.mark.parametrize("qid", sorted(YAGO_QUERIES))
def test_yago_query(qid, yago):
    got, ref = run(YAGO_QUERIES[qid], yago)
    assert got == ref
    assert ref, f"{qid} should be satisfiable at test scale"


@pytest.mark.parametrize("qid", sorted(UNIPROT_QUERIES))
def test_uniprot_query(qid, uni):
    got, ref = run(UNIPROT_QUERIES[qid], uni)
    assert got == ref
    assert ref, f"{qid} should be satisfiable at test scale"


def test_class_coverage():
    """Paper §V-D: for each class C_i, at least one query belongs to it
    (our structural classifier over the full workload)."""
    seen = set()
    for qs in {**YAGO_QUERIES, **UNIPROT_QUERIES}.values():
        seen |= query_classes(qs)
    assert {"C1", "C2", "C3", "C4", "C5", "C6"} <= seen
