"""The paper's non-UCRPQ μ-RA terms (§V-D-c), constructed verbatim.

All three belong to class C1. aⁿbⁿ and same-generation have **no**
stable column (each iteration replaces both endpoints), so the paper's
plan selection runs them with P_gld; reach has a stable (then dropped)
source column and runs with P_plw after the antiprojection is pushed.
"""
from __future__ import annotations

from .query2mu import DST, SRC, label_term
from .terms import (
    AntiProject,
    EqConst,
    Filter,
    Fix,
    Join,
    Rel,
    Rename,
    Term,
    Union_,
    Var,
    compose,
)


def anbn_term(graph: str = "G", a: str = "a", b: str = "b") -> Term:
    """Pairs connected by a path aⁿbⁿ (n ≥ 1) over (src,label,dst) triples.

    μ(X = a∘b ∪ a∘X∘b), with the middle-composition spelled out exactly
    as in the paper (§V-D-c): the recursive branch surrounds X with one
    a-edge on the left and one b-edge on the right.
    """
    ta = label_term(a, graph=graph)
    tb = label_term(b, graph=graph)
    seed = compose(ta, tb, "m0")
    # a ∘ X: π̃_m(ρ_dst→m(a) ⋈ ρ_src→m(X)) keeping X's dst renamed to n.
    x_mid = Rename(DST, "n", Var("X"))  # (src, n)
    left = AntiProject(
        ("m1",), Join(Rename(DST, "m1", ta), Rename(SRC, "m1", x_mid))
    )  # (src, n)
    body = AntiProject(("n",), Join(left, Rename(SRC, "n", tb)))  # (src, dst)
    return Fix("X", Union_(seed, body))


def same_generation_term(rel: str = "R") -> Term:
    """Same-generation pairs over a parent relation R(src,dst) (child →
    parent): sg(x,y) ⇐ shared parent, or parents of x,y in sg.

    μ(X = π̃_m(ρ_dst→m(R) ⋈ ρ'(R)) ∪ π̃(R ∘ X ∘ R⁻-style step)) — the
    paper's §V-D-c term, with explicit renames for the second R copy.
    """
    r = Rel(rel)
    copy1 = Rename(DST, "m", r)  # (src, m): x with parent m
    copy2 = Rename(SRC, DST, Rename(DST, "m", r))  # (dst, m): y with parent m
    seed = AntiProject(("m",), Join(copy1, copy2))  # sibling pairs (src,dst)
    # step: R(x, xp) ⋈ X(xp, yp) ⋈ R(y, yp)
    a = Rename(DST, "m", r)  # (src, m)   x, xp=m
    x_ = Rename(SRC, "m", Rename(DST, "n", Var("X")))  # (m, n) xp, yp
    b = Rename(SRC, DST, Rename(DST, "n", r))  # (dst, n)  y, yp=n
    body = AntiProject(("n",), Join(AntiProject(("m",), Join(a, x_)), b))
    return Fix("X", Union_(seed, body))


def reach_term(source: int, rel: str = "R") -> Term:
    """Nodes reachable from ``source``: π̃_src(μ(X = σ_src=N(R) ∪ X∘R)).

    Written exactly as the paper does (antiprojection outside); the
    MuRewriter pushes it into the fixpoint (§III push-antiprojection).
    """
    seed = Filter(EqConst(SRC, source), Rel(rel))
    step = compose(Var("X"), Rel(rel), "m0")
    return AntiProject((SRC,), Fix("X", Union_(seed, step)))
