"""MuRewriter rules: applicability conditions and semantics preservation.

Every rule is checked two ways: (a) it fires exactly when its side
conditions hold, and (b) rewritten terms evaluate to the same relation
as the originals on random graphs (pandas backend vs itself)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.compiler_pandas import eval_pandas
from repro.core.fcond import constant_variable_split
from repro.core.query2mu import GRAPH_SCHEMA, crpq_to_term, label_term
from repro.core.rewriter import (
    closure,
    is_pure_closure,
    match_compose,
    match_linear_closure,
    merged_closure,
    rewrite,
    seeded_closure,
    try_merge,
    try_push_antiproject,
    try_push_filter,
    try_push_join,
    try_reverse,
)
from repro.core.rpq import parse_query
from repro.core.terms import (
    AntiProject,
    EqConst,
    Filter,
    Fix,
    Rel,
    Term,
    Union_,
    Var,
    compose,
    walk,
)

SD = frozenset({"src", "dst"})
ENV = {"E": SD, "S": SD, "A": SD, "B": SD}


@pytest.fixture(scope="module")
def graphs():
    rng = np.random.default_rng(7)
    def mk(seed):
        g = np.random.default_rng(seed)
        return pd.DataFrame(
            {"src": g.integers(0, 40, 140), "dst": g.integers(0, 40, 140)}
        ).drop_duplicates(ignore_index=True)
    return {"E": mk(1), "S": mk(2).head(25), "A": mk(3), "B": mk(4)}


def rows(df, cols=("src", "dst")):
    cols = [c for c in cols if c in df.columns] or list(df.columns)
    return set(map(tuple, df[cols].values.tolist()))


def assert_same_semantics(t1: Term, t2: Term, graphs):
    a, b = eval_pandas(t1, graphs), eval_pandas(t2, graphs)
    assert set(a.columns) == set(b.columns)
    assert rows(a, sorted(a.columns)) == rows(b, sorted(a.columns))


def right_tc(seed="S", step="E"):
    return Fix("X", Union_(Rel(seed), compose(Var("X"), Rel(step))))


def left_tc(seed="S", step="E"):
    return Fix("X", Union_(Rel(seed), compose(Rel(step), Var("X"))))


class TestMatchers:
    def test_match_compose(self):
        c = match_compose(compose(Rel("A"), Rel("B"), "m3"))
        assert c is not None and c.left == Rel("A") and c.right == Rel("B") and c.mid == "m3"

    def test_match_compose_rejects_other(self):
        assert match_compose(Rel("A")) is None
        assert match_compose(AntiProject(("src",), Rel("A"))) is None

    def test_match_linear_right(self):
        lc = match_linear_closure(right_tc())
        assert lc is not None and lc.orientation == "right" and lc.step == Rel("E")

    def test_match_linear_left(self):
        lc = match_linear_closure(left_tc())
        assert lc is not None and lc.orientation == "left"

    def test_merged_not_linear(self):
        assert match_linear_closure(merged_closure(Rel("A"), Rel("B"))) is None

    def test_pure_closure(self):
        assert is_pure_closure(right_tc("E", "E")) is not None
        assert is_pure_closure(right_tc("S", "E")) is None


class TestPushFilter:
    def test_fires_on_stable(self, graphs):
        t = Filter(EqConst("src", 3), right_tc())
        out = try_push_filter(t, ENV)
        assert out is not None and isinstance(out, Fix)
        assert_same_semantics(t, out, graphs)

    def test_blocked_on_unstable(self):
        t = Filter(EqConst("dst", 3), right_tc())
        assert try_push_filter(t, ENV) is None

    def test_left_orientation_dst_stable(self, graphs):
        t = Filter(EqConst("dst", 3), left_tc())
        out = try_push_filter(t, ENV)
        assert out is not None
        assert_same_semantics(t, out, graphs)


class TestPushAntiproject:
    def test_fires_on_stable_unused(self, graphs):
        t = AntiProject(("src",), right_tc())
        out = try_push_antiproject(t, ENV)
        assert out is not None and isinstance(out, Fix)
        assert_same_semantics(t, out, graphs)

    def test_blocked_on_used(self):
        # dst is consumed by the step of a right-linear closure
        t = AntiProject(("dst",), right_tc())
        assert try_push_antiproject(t, ENV) is None


class TestReverse:
    def test_pure_closure_reverses(self, graphs):
        fix = closure(Rel("E"), "right")
        out = try_reverse(fix)
        assert out is not None
        assert match_linear_closure(out).orientation == "left"
        assert_same_semantics(fix, out, graphs)

    def test_seeded_not_reversed(self):
        assert try_reverse(right_tc()) is None


class TestPushJoin:
    def test_seed_right_closure_from_left(self, graphs):
        t = compose(Rel("A"), right_tc("E", "E"))
        out = try_push_join(t)
        assert isinstance(out, Fix)
        assert_same_semantics(t, out, graphs)

    def test_seed_left_closure_from_right(self, graphs):
        t = compose(left_tc("E", "E"), Rel("B"))
        out = try_push_join(t)
        assert isinstance(out, Fix)
        assert_same_semantics(t, out, graphs)

    def test_reverses_pure_closure_when_needed(self, graphs):
        # B ∘ (left-oriented pure closure): needs reversal first.
        t = compose(Rel("A"), left_tc("E", "E"))
        out = try_push_join(t)
        assert isinstance(out, Fix)
        assert_same_semantics(t, out, graphs)

    def test_blocked_on_seeded_wrong_orientation(self):
        # A ∘ (left-oriented *seeded*) cannot be pushed without general
        # reversal (out of scope — planner picks orientation instead).
        t = compose(Rel("A"), left_tc("S", "E"))
        assert try_push_join(t) is None


class TestMerge:
    def test_merges_pure_closures(self, graphs):
        t = compose(closure(Rel("A")), closure(Rel("B")))
        out = try_merge(t)
        assert isinstance(out, Fix)
        # merged fixpoint has three union branches
        const, phi = constant_variable_split(out)
        from repro.core.fcond import union_branches

        assert len(union_branches(phi)) == 2
        assert_same_semantics(t, out, graphs)

    def test_blocked_on_seeded(self):
        t = compose(right_tc("S", "A"), closure(Rel("B")))
        assert try_merge(t) is None


class TestDriver:
    @pytest.mark.parametrize(
        "query",
        [
            "?x, ?y <- ?x a+ ?y",
            "?x <- ?x a+ 5",
            "?x <- 5 a+ ?x",
            "?x, ?y <- ?x a+/b ?y",
            "?x, ?y <- ?x b/a+ ?y",
            "?x, ?y <- ?x a+/b+ ?y",
            "?y <- ?x a+ ?y",
            "?x <- 5 a/b+ ?x",
        ],
    )
    def test_rewrite_preserves_semantics_on_naive_terms(self, query):
        g = np.random.default_rng(11)
        tri = pd.DataFrame(
            {
                "src": g.integers(0, 30, 120),
                "label": g.choice(["a", "b"], 120),
                "dst": g.integers(0, 30, 120),
            }
        ).drop_duplicates(ignore_index=True)
        naive = crpq_to_term(parse_query(query))
        opt = rewrite(naive, GRAPH_SCHEMA)
        a = eval_pandas(naive, {"G": tri})
        b = eval_pandas(opt, {"G": tri})
        cols = sorted(a.columns)
        assert rows(a, cols) == rows(b, cols)

    def test_rewrite_pushes_filter_through_reversal(self):
        # naive C2 (?x a+ C) must end with a seeded left-oriented fixpoint
        naive = crpq_to_term(parse_query("?x <- ?x a+ 5"))
        opt = rewrite(naive, GRAPH_SCHEMA)
        fixes = [s for s in walk(opt) if isinstance(s, Fix)]
        assert len(fixes) == 1
        lc = match_linear_closure(fixes[0])
        assert lc is not None and lc.orientation == "left"
        assert is_pure_closure(fixes[0]) is None  # seeded, not full

    def test_rewrite_merges_concatenated_closures(self):
        naive = crpq_to_term(parse_query("?x, ?y <- ?x a+/b+ ?y"))
        opt = rewrite(naive, GRAPH_SCHEMA)
        fixes = [s for s in walk(opt) if isinstance(s, Fix)]
        assert len(fixes) == 1  # merged into a single fixpoint
        assert match_linear_closure(fixes[0]) is None

    def test_rewrite_idempotent(self):
        naive = crpq_to_term(parse_query("?x <- ?x a+/b ?y"))
        once = rewrite(naive, GRAPH_SCHEMA)
        assert rewrite(once, GRAPH_SCHEMA) == once
