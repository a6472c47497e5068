"""Stable-column analysis tests (paper §IV-A2 / Def. 10 of [11])."""
import pytest

from repro.core.fcond import constant_variable_split
from repro.core.stabilizer import provenance, stable_columns, used_columns
from repro.core.terms import (
    AntiProject,
    EqConst,
    Filter,
    Fix,
    Join,
    Rel,
    Rename,
    Union_,
    Var,
    compose,
)

SD = frozenset({"src", "dst"})
ENV = {"E": SD, "S": SD}


def phi_of(fix):
    return constant_variable_split(fix)[1]


def right_linear():
    return Fix("X", Union_(Rel("S"), compose(Var("X"), Rel("E"))))


def left_linear():
    return Fix("X", Union_(Rel("S"), compose(Rel("E"), Var("X"))))


class TestStableColumns:
    def test_right_linear_src_stable(self):
        # Paper's Example 2: 'src' is stable, 'dst' is not.
        assert stable_columns(phi_of(right_linear()), "X", ENV, SD) == {"src"}

    def test_left_linear_dst_stable(self):
        assert stable_columns(phi_of(left_linear()), "X", ENV, SD) == {"dst"}

    def test_merged_no_stable(self):
        phi = Union_(
            compose(Rel("E"), Var("X"), "m1"), compose(Var("X"), Rel("E"), "m2")
        )
        assert stable_columns(phi, "X", ENV, SD) == frozenset()

    def test_var_only_all_stable(self):
        assert stable_columns(Var("X"), "X", ENV, SD) == SD

    def test_filter_preserves_stability(self):
        phi = Filter(EqConst("src", 3), compose(Var("X"), Rel("E")))
        assert stable_columns(phi, "X", ENV, SD) == {"src"}

    def test_rename_breaks_stability(self):
        # X's src renamed away and E's src renamed to 'src': not stable.
        phi = AntiProject(
            ("m",), Join(Rename("src", "m", Var("X")), Rename("dst", "m", Rel("E")))
        )
        # output src comes from E, dst from X — dst keeps its name/value.
        assert stable_columns(phi, "X", ENV, SD) == {"dst"}

    def test_union_intersects(self):
        phi = Union_(compose(Var("X"), Rel("E")), Var("X"))
        # Branch 1 stabilizes only src; branch 2 stabilizes both.
        assert stable_columns(phi, "X", ENV, SD) == {"src"}

    def test_unary_fixpoint(self):
        # Reach-style: X over {dst} only.
        xs = frozenset({"dst"})
        phi = compose(Var("X"), Rel("E"))
        assert stable_columns(phi, "X", ENV, xs) == frozenset()


class TestProvenance:
    def test_join_shared_column_keeps_x_provenance(self):
        # X ⋈ E on shared columns: values flow from X where X provides them.
        p = provenance(Join(Var("X"), Rel("E")), "X", ENV, SD)
        assert p == {"src": "src", "dst": "dst"}

    def test_constant_side_is_none(self):
        p = provenance(
            Join(Rename("dst", "m", Var("X")), Rename("src", "m", Rel("E"))), "X", ENV, SD
        )
        assert p["src"] == "src"
        assert p["dst"] is None  # comes from E
        assert p["m"] == "dst"  # X's dst under a new name — not stable

    def test_antiproject_drops_key(self):
        p = provenance(AntiProject(("dst",), Var("X")), "X", ENV, SD)
        assert p == {"src": "src"}


class TestUsedColumns:
    def test_right_linear_uses_dst(self):
        phi = phi_of(right_linear())
        assert used_columns(phi, "X", ENV, SD) == {"dst", "m0"}

    def test_left_linear_uses_src(self):
        phi = phi_of(left_linear())
        assert used_columns(phi, "X", ENV, SD) == {"src", "m0"}

    def test_filter_marks_used(self):
        phi = Filter(EqConst("src", 1), compose(Var("X"), Rel("E")))
        assert "src" in used_columns(phi, "X", ENV, SD)

    def test_raw_join_shared_cols_used(self):
        phi = Join(Var("X"), Rel("E"))
        assert used_columns(phi, "X", ENV, SD) == SD
