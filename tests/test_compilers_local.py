"""Pandas and DuckDB backends: operator-level agreement with each other
and with hand-computed results, plus property-based random-term tests."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.compiler_pandas import (
    anti_join,
    dedup,
    eval_pandas,
    natural_join,
    set_difference,
    set_union,
)
from repro.core.compiler_sql import DuckdbEvaluator, eval_duckdb, to_sql
from repro.core.terms import (
    AntiJoin,
    AntiProject,
    EqCol,
    EqConst,
    Filter,
    Fix,
    Join,
    Rel,
    Rename,
    SchemaError,
    Union_,
    Var,
    compose,
    inverse,
)
from tests.conftest import FIG2_E, FIG2_FIXPOINT, FIG2_S

SD = frozenset({"src", "dst"})


def rows(df):
    return set(map(tuple, df[sorted(df.columns)].values.tolist()))


@pytest.fixture(scope="module")
def r():
    g = np.random.default_rng(0)
    return pd.DataFrame({"src": g.integers(0, 20, 60), "dst": g.integers(0, 20, 60)}).drop_duplicates(ignore_index=True)


@pytest.fixture(scope="module")
def s():
    g = np.random.default_rng(1)
    return pd.DataFrame({"src": g.integers(0, 20, 40), "dst": g.integers(0, 20, 40)}).drop_duplicates(ignore_index=True)


TERMS = [
    Rel("R"),
    Union_(Rel("R"), Rel("S")),
    Join(Rel("R"), Rel("S")),
    AntiJoin(Rel("R"), Rel("S")),
    Filter(EqConst("src", 3), Rel("R")),
    Filter(EqCol("src", "dst"), Rel("R")),
    AntiProject(("src",), Rel("R")),
    Rename("src", "x", Rel("R")),
    compose(Rel("R"), Rel("S")),
    inverse(Rel("R")),
    compose(inverse(Rel("R")), Rel("S")),
    Union_(compose(Rel("R"), Rel("S")), Rel("R")),
    AntiJoin(compose(Rel("R"), Rel("S")), Rel("R")),
    Fix("X", Union_(Rel("S"), compose(Var("X"), Rel("R")))),
    Fix("X", Union_(Rel("S"), compose(Rel("R"), Var("X")))),
    Fix("X", Union_(compose(Rel("R"), Rel("S")), Union_(compose(Rel("R"), Var("X"), "m1"), compose(Var("X"), Rel("S"), "m2")))),
]


@pytest.mark.parametrize("term", TERMS, ids=[str(t)[:60] for t in TERMS])
def test_pandas_duckdb_agree(term, r, s):
    a = eval_pandas(term, {"R": r, "S": s})
    b = eval_duckdb(term, {"R": r, "S": s})
    assert set(a.columns) == set(b.columns)
    assert rows(a) == rows(b)


def test_fig2_example_pandas():
    fix = Fix("X", Union_(Rel("S"), compose(Var("X"), Rel("E"))))
    out = eval_pandas(fix, {"S": FIG2_S, "E": FIG2_E})
    assert sorted(map(tuple, out[["src", "dst"]].values.tolist())) == FIG2_FIXPOINT


def test_fig2_example_duckdb():
    fix = Fix("X", Union_(Rel("S"), compose(Var("X"), Rel("E"))))
    out = eval_duckdb(fix, {"S": FIG2_S, "E": FIG2_E})
    assert sorted(map(tuple, out[["src", "dst"]].values.tolist())) == FIG2_FIXPOINT


class TestPandasOps:
    def test_set_union_dedups(self):
        a = pd.DataFrame({"x": [1, 2]})
        b = pd.DataFrame({"x": [2, 3]})
        assert sorted(set_union(a, b)["x"]) == [1, 2, 3]

    def test_set_union_column_order(self):
        a = pd.DataFrame({"x": [1], "y": [2]})
        b = pd.DataFrame({"y": [5], "x": [4]})
        assert rows(set_union(a, b)) == {(1, 2), (4, 5)}

    def test_set_difference(self):
        a = pd.DataFrame({"x": [1, 2, 3]})
        b = pd.DataFrame({"x": [2]})
        assert sorted(set_difference(a, b)["x"]) == [1, 3]

    def test_set_difference_empty_b(self):
        a = pd.DataFrame({"x": [1, 1, 2]})
        out = set_difference(a, a.iloc[0:0])
        assert sorted(out["x"]) == [1, 2]  # also dedups a

    def test_natural_join_shared(self):
        a = pd.DataFrame({"k": [1, 2], "u": [10, 20]})
        b = pd.DataFrame({"k": [2, 3], "v": [200, 300]})
        out = natural_join(a, b)
        assert rows(out) == {(2, 20, 200)}

    def test_natural_join_cross(self):
        a = pd.DataFrame({"u": [1, 2]})
        b = pd.DataFrame({"v": [9]})
        assert len(natural_join(a, b)) == 2

    def test_anti_join(self):
        a = pd.DataFrame({"k": [1, 2], "u": [10, 20]})
        b = pd.DataFrame({"k": [2], "w": [0]})
        assert rows(anti_join(a, b)) == {(1, 10)}

    def test_anti_join_no_shared_nonempty_right(self):
        a = pd.DataFrame({"u": [1]})
        b = pd.DataFrame({"v": [2]})
        assert anti_join(a, b).empty

    def test_dedup(self):
        assert len(dedup(pd.DataFrame({"x": [1, 1, 2]}))) == 2


class TestSqlCompiler:
    def test_to_sql_rejects_fixpoint(self):
        with pytest.raises(SchemaError):
            to_sql(Fix("X", Union_(Rel("R"), compose(Var("X"), Rel("R")))), {"R": SD})

    def test_to_sql_string_constant_quoting(self, r):
        t = Filter(EqConst("label", "O'Brien"), Rel("T"))
        tri = pd.DataFrame({"src": [1], "label": ["O'Brien"], "dst": [2]})
        out = eval_duckdb(t, {"T": tri})
        assert len(out) == 1

    def test_evaluator_reuse(self, r, s):
        ev = DuckdbEvaluator({"R": r, "S": s})
        try:
            a = ev.evaluate(compose(Rel("R"), Rel("S")))
            b = ev.evaluate(Join(Rel("R"), Rel("S")))
            assert not a.empty or not b.empty or r.empty
        finally:
            ev.con.close()

    def test_nested_fixpoints(self, r, s):
        inner = Fix("Y", Union_(Rel("S"), compose(Var("Y"), Rel("R"))))
        outer = Fix("X", Union_(Rel("S"), compose(Var("X"), inner)))
        a = eval_pandas(outer, {"R": r, "S": s})
        b = eval_duckdb(outer, {"R": r, "S": s})
        assert rows(a) == rows(b)


@settings(max_examples=25, deadline=None)
@given(
    edges=st.lists(
        st.tuples(st.integers(0, 8), st.integers(0, 8)), min_size=1, max_size=40
    ),
    seeds=st.lists(
        st.tuples(st.integers(0, 8), st.integers(0, 8)), min_size=1, max_size=10
    ),
)
def test_fixpoint_pandas_matches_bruteforce(edges, seeds):
    """Property: semi-naive pandas fixpoint == brute-force closure."""
    e = pd.DataFrame(edges, columns=["src", "dst"]).drop_duplicates(ignore_index=True)
    s = pd.DataFrame(seeds, columns=["src", "dst"]).drop_duplicates(ignore_index=True)
    fix = Fix("X", Union_(Rel("S"), compose(Var("X"), Rel("E"))))
    out = eval_pandas(fix, {"S": s, "E": e})
    got = set(map(tuple, out[["src", "dst"]].values.tolist()))
    # brute force: S ∘ E^*
    est = set(map(tuple, e[["src", "dst"]].values.tolist()))
    total = set(map(tuple, s[["src", "dst"]].values.tolist()))
    for _ in range(100):
        nxt = {(a, d) for (a, b) in total for (c, d) in est if b == c}
        if nxt <= total:
            break
        total |= nxt
    assert got == total
