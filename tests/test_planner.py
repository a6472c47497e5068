"""Planner end-to-end tests (pandas execution): plan quality properties
and agreement with the independent reference evaluator across query
classes, graph shapes, and seeds."""
import numpy as np
import pandas as pd
import pytest

from repro.core.compiler_pandas import eval_pandas
from repro.core.cost import GraphStats
from repro.core.planner import plan_crpq
from repro.core.query2mu import GRAPH, GRAPH_SCHEMA
from repro.core.reference import eval_crpq
from repro.core.rewriter import is_pure_closure, match_linear_closure
from repro.core.rpq import parse_query
from repro.core.terms import Fix, schema, walk


def labeled_graph(seed: int, n: int = 50, m: int = 200, labels=("a", "b", "c")):
    g = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "src": g.integers(0, n, m),
            "label": g.choice(list(labels), m),
            "dst": g.integers(0, n, m),
        }
    ).drop_duplicates(ignore_index=True)


QUERIES = [
    "?x, ?y <- ?x a+ ?y",
    "?x <- ?x a+ 7",
    "?x <- 7 a+ ?x",
    "?x, ?y <- ?x a+/b ?y",
    "?x, ?y <- ?x b/a+ ?y",
    "?x, ?y <- ?x a+/b+ ?y",
    "?x, ?y <- ?x a+/b+/c+ ?y",
    "?x, ?y <- ?x (a|b)+ ?y",
    "?x, ?y <- ?x -a/b+ ?y",
    "?x <- ?x (a/-a)+ 7",
    "?y <- ?x a+ ?y",
    "?y <- 7 a+ ?y",
    "?x, ?y, ?z <- ?x a+ ?y, ?y b ?z",
    "?x <- ?x a+ ?x",
    "?x <- 7 a/b+ ?x",
    "?x <- ?x b+/a 7",
    "?x, ?y <- ?x (a/b)+ ?y",
    "?x, ?z <- ?x a+ 7, ?x b+ ?z",
]


@pytest.mark.parametrize("seed", [0, 1, 2])
@pytest.mark.parametrize("query", QUERIES)
def test_planned_term_matches_reference(query, seed):
    tri = labeled_graph(seed)
    triples = [(int(s), str(l), int(d)) for s, l, d in tri.itertuples(index=False)]
    q = parse_query(query)
    rep = plan_crpq(q, GraphStats.from_pandas(tri))
    out = eval_pandas(rep.term, {GRAPH: tri})
    cols = ["v_" + h[1:] for h in q.head]
    got = set(map(tuple, out[cols].values.tolist()))
    assert got == eval_crpq(q, triples)


class TestPlanShape:
    @pytest.fixture(scope="class")
    def stats(self):
        return GraphStats.from_pandas(labeled_graph(0))

    def fixes(self, term):
        return [s for s in walk(term) if isinstance(s, Fix)]

    def test_c2_reversed_and_seeded(self, stats):
        rep = plan_crpq("?x <- ?x a+ 7", stats)
        (fix,) = self.fixes(rep.term)
        lc = match_linear_closure(fix)
        assert lc is not None and lc.orientation == "left"
        assert is_pure_closure(fix) is None  # seeded with the filter

    def test_c3_seeded_right(self, stats):
        rep = plan_crpq("?x <- 7 a+ ?x", stats)
        (fix,) = self.fixes(rep.term)
        lc = match_linear_closure(fix)
        assert lc is not None and lc.orientation == "right"
        assert is_pure_closure(fix) is None

    def test_c6_merged_single_fixpoint(self, stats):
        rep = plan_crpq("?x, ?y <- ?x a+/b+ ?y", stats)
        assert len(self.fixes(rep.term)) == 1
        assert match_linear_closure(self.fixes(rep.term)[0]) is None

    def test_c6_with_filter_prefers_seeded_chain(self, stats):
        # ?x a+/b+ C: reversal + two seeded fixpoints beats merging
        rep = plan_crpq("?x <- ?x a+/b+ 7", stats)
        for f in self.fixes(rep.term):
            assert is_pure_closure(f) is None  # no full closure anywhere

    def test_antiprojection_pushed_reach(self, stats):
        rep = plan_crpq("?y <- 7 a+ ?y", stats)
        (fix,) = self.fixes(rep.term)
        assert schema(fix, GRAPH_SCHEMA) == frozenset({"dst"})

    def test_candidates_recorded(self, stats):
        rep = plan_crpq("?x, ?y <- ?x a+/b+ ?y", stats)
        names = {n for n, _ in rep.candidates}
        assert {"ltr", "rtl", "merged-first"} <= names
        assert rep.cost == min(c for _, c in rep.candidates)

    def test_full_closure_kept_when_no_filter(self, stats):
        rep = plan_crpq("?x, ?y <- ?x a+ ?y", stats)
        (fix,) = self.fixes(rep.term)
        assert is_pure_closure(fix) is not None

    def test_head_unbound_raises(self, stats):
        with pytest.raises(ValueError, match="not bound"):
            plan_crpq("?z <- ?x a+ ?y", stats)

    def test_unknown_constant_raises(self, stats):
        with pytest.raises(KeyError):
            plan_crpq("?x <- ?x a+ Nowhere", stats)


class TestCostModel:
    def test_filtered_seed_cheaper_than_full(self):
        tri = labeled_graph(0, n=60, m=400)
        stats = GraphStats.from_pandas(tri)
        full = plan_crpq("?x, ?y <- ?x a+ ?y", stats)
        filt = plan_crpq("?x <- ?x a+ 7", stats)
        assert filt.cost < full.cost

    def test_merged_cheaper_than_two_closures(self):
        from repro.core.cost import CostModel
        from repro.core.query2mu import crpq_to_term
        from repro.core.rewriter import rewrite

        tri = labeled_graph(1, n=80, m=600)
        stats = GraphStats.from_pandas(tri)
        cm = CostModel(stats)
        naive = crpq_to_term(parse_query("?x, ?y <- ?x a+/b+ ?y"))
        merged = rewrite(naive, GRAPH_SCHEMA)
        assert cm.cost(merged) < cm.cost(naive)

    def test_deep_concatenation_plans(self):
        """Regression: a1+/…/a10+ needs >10 distinct middle columns
        (fresh_mid must not be bounded)."""
        from repro.bench.suites import concat_graph, concat_query
        from repro.core.reference import eval_crpq

        tri = concat_graph(n_nodes=80, n_labels=10, seed=3)
        triples = [(int(s), str(l), int(d)) for s, l, d in tri.itertuples(index=False)]
        stats = GraphStats.from_pandas(tri)
        for n in (6, 10):
            q = parse_query(concat_query(n))
            rep = plan_crpq(q, stats)
            out = eval_pandas(rep.term, {GRAPH: tri})
            got = set(map(tuple, out[["v_x", "v_y"]].values.tolist()))
            assert got == eval_crpq(q, triples)

    def test_estimates_monotone_in_graph_size(self):
        small = GraphStats.from_pandas(labeled_graph(0, n=30, m=100))
        big = GraphStats.from_pandas(labeled_graph(0, n=300, m=4000))
        cs = plan_crpq("?x, ?y <- ?x a+ ?y", small).cost
        cb = plan_crpq("?x, ?y <- ?x a+ ?y", big).cost
        assert cb > cs
