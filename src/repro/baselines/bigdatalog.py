"""BigDatalog-like baseline (paper §V-C, §VI).

BigDatalog is a distributed semi-naive Datalog engine on Spark. Its
*optimization capability envelope*, as characterized by the paper:

* programs are written/evaluated **left-to-right** (left-linear rules);
* Magic Sets / Demand Transformation push selections and propagate
  bindings *in that direction only* — a leading constant seeds the
  recursion, bindings flow into subsequent closures;
* **no fixpoint reversal** — a filter to the *right* of a recursion
  (class C2) cannot be pushed: the full closure is computed, then
  filtered;
* **no fixpoint merging** (impossible in the Datalog framework) —
  concatenated closures a⁺/b⁺ compute the full first closure and chain;
* it *does* have decomposable-plan distribution (GPS + SetRDD), so its
  fixpoints run with the same communication-efficient physical plan as
  Dist-μ-RA's P_plw when a stable column exists.

We reproduce exactly that: the LTR-only skeleton, a restricted
MuRewriter with reversal and merging disabled, and the shared physical
fixpoint machinery.
"""
from __future__ import annotations

from typing import Mapping, Optional

from pyspark.sql import DataFrame, SparkSession

from ..core.compiler_spark import FixConfig, eval_spark
from ..core.fcond import union_of
from ..core.planner import _items, _ltr_skeleton
from ..core.query2mu import DST, GRAPH, GRAPH_SCHEMA, SRC, _Fresh, _resolve, join_project_head
from ..core.rewriter import (
    LinearClosure,
    match_compose,
    match_linear_closure,
    rewrite,
    seeded_closure,
    try_filter_descend,
    try_push_antiproject,
    try_push_filter,
)
from ..core.rpq import CRPQ, distribute_alts, is_var, parse_query, var_col
from ..core.terms import AntiProject, EqConst, Filter, Fix, Rename, Term, compose, fresh_mid


def _try_push_join_noreverse(t: Term) -> Optional[Term]:
    """push-join restricted to matching orientations (no reversal)."""
    c = match_compose(t)
    if c is None:
        return None
    if isinstance(c.right, Fix):
        lc = match_linear_closure(c.right)
        if lc is not None and lc.orientation == "right":
            seed = compose(c.left, lc.const, fresh_mid(c.left, lc.const, lc.step))
            return seeded_closure(seed, lc.step, "right")
    if isinstance(c.left, Fix):
        lc = match_linear_closure(c.left)
        if lc is not None and lc.orientation == "left":
            seed = compose(lc.const, c.right, fresh_mid(c.right, lc.const, lc.step))
            return seeded_closure(seed, lc.step, "left")
    return None


_PHASE1 = (try_push_filter, try_filter_descend, try_push_antiproject)
_PHASE2 = (_try_push_join_noreverse,)


def plan_crpq_bigdatalog(q: CRPQ | str, consts: Mapping[str, int] | None = None) -> Term:
    """Left-to-right Datalog-style logical plan (no reversal/merging)."""
    if isinstance(q, str):
        q = parse_query(q)
    consts = consts or {}
    atom_terms = []
    for atom in q.atoms:
        subj_v = None if is_var(atom.subj) else _resolve(atom.subj, consts)
        obj_v = None if is_var(atom.obj) else _resolve(atom.obj, consts)
        branches = []
        for rx in distribute_alts(atom.rx):
            skel = _ltr_skeleton(_items(rx), subj_v, _Fresh())
            if obj_v is not None:
                skel = Filter(EqConst(DST, obj_v), skel)
            branches.append(
                rewrite(skel, GRAPH_SCHEMA, phase1=_PHASE1, phase2=_PHASE2)
            )
        t = union_of(branches)
        if subj_v is not None:
            t = AntiProject((SRC,), t)
        if obj_v is not None:
            t = AntiProject((DST,), t)
        if is_var(atom.subj) and atom.subj == atom.obj:
            from ..core.terms import EqCol

            t = Rename(SRC, var_col(atom.subj), AntiProject((DST,), Filter(EqCol(SRC, DST), t)))
            atom_terms.append(t)
            continue
        if is_var(atom.subj):
            t = Rename(SRC, var_col(atom.subj), t)
        if is_var(atom.obj):
            t = Rename(DST, var_col(atom.obj), t)
        atom_terms.append(t)
    return join_project_head(atom_terms, q)


def eval_crpq_bigdatalog(
    spark: SparkSession,
    graph: DataFrame,
    q: CRPQ | str,
    consts: Mapping[str, int] | None = None,
    cfg: FixConfig | None = None,
) -> DataFrame:
    """Evaluate with BigDatalog's plan; physical fixpoints use the same
    decomposable machinery (auto = SetRDD-style local loops when a
    stable column exists, as BigDatalog's GPS technique provides)."""
    term = plan_crpq_bigdatalog(q, consts)
    return eval_spark(term, {GRAPH: graph}, spark, cfg or FixConfig())
