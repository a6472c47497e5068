"""uniprot_n: gMark-style synthetic protein graph (DESIGN.md §4).

The paper generates Uniprot-modelled graphs with the gMark benchmark
tool (1M/5M/10M edges). We synthesize the same label schema at 1:100
scale. Node-id ranges partition entity types; edge labels and shapes
follow the queries of Fig. 6:

======== ===================== =============================
label     shape                 role in the queries
======== ===================== =============================
int       protein → protein     interacts; its closure int+ is the big TC
enc       protein → gene        (enc/-enc)+ = co-encoding closure
occ       protein → annotation  (occ/-occ)+
hKw       protein → keyword     hub keywords → -hKw fans out
ref       protein → reference   (ref/-ref)+ largest co-X closure (Q46)
auth      reference → author    (auth/-auth)+
pub       journal → reference   C -pub/… seeds
======== ===================== =============================

Degree skew: references/keywords/authors are zipf-shared so the
bipartite co-X closures blow up quadratically in hub degree — the
paper's Q46 closure is ~150× the graph size, and this generator
reproduces that regime.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

# Fractions of the edge budget per label.
_EDGE_MIX = {
    "int": 0.30,
    "enc": 0.14,
    "occ": 0.14,
    "hKw": 0.14,
    "ref": 0.16,
    "auth": 0.09,
    "pub": 0.03,
}

# Entity-type counts as fractions of the node budget (n_nodes ≈ n_edges,
# matching the paper's 1.02M nodes per 1.0M edges).
_NODE_MIX = {
    "protein": 0.55,
    "gene": 0.12,
    "annotation": 0.12,
    "keyword": 0.02,
    "reference": 0.12,
    "author": 0.06,
    "journal": 0.01,
}


def _zipf_targets(g: np.random.Generator, lo: int, hi: int, size: int, a: float = 1.3) -> np.ndarray:
    """Zipf-biased draws from [lo, hi): a few hub entities get most edges."""
    k = hi - lo
    ranks = np.arange(1, k + 1, dtype=np.float64)
    w = ranks ** (-a)
    w /= w.sum()
    return lo + g.choice(k, size=size, p=w)


def uniprot(n_edges: int, seed: int = 0) -> tuple[pd.DataFrame, dict[str, tuple[int, int]]]:
    """Generate ≈``n_edges`` triples; returns (triples, type→id-range)."""
    g = np.random.default_rng(seed)
    n_nodes = max(16, int(n_edges * 1.0))
    ranges: dict[str, tuple[int, int]] = {}
    at = 0
    for t, f in _NODE_MIX.items():
        cnt = max(2, int(n_nodes * f))
        ranges[t] = (at, at + cnt)
        at += cnt

    def uni(lo: int, hi: int, size: int) -> np.ndarray:
        return g.integers(lo, hi, size)

    p_lo, p_hi = ranges["protein"]
    frames = []
    for label, frac in _EDGE_MIX.items():
        m = max(1, int(n_edges * frac))
        if label == "int":
            src = uni(p_lo, p_hi, m)
            dst = _zipf_targets(g, p_lo, p_hi, m, a=1.1)
        elif label == "enc":
            src = uni(p_lo, p_hi, m)
            dst = uni(*ranges["gene"], m)
        elif label == "occ":
            src = uni(p_lo, p_hi, m)
            dst = uni(*ranges["annotation"], m)
        elif label == "hKw":
            src = uni(p_lo, p_hi, m)
            dst = _zipf_targets(g, *ranges["keyword"], m, a=1.2)
        elif label == "ref":
            src = uni(p_lo, p_hi, m)
            dst = _zipf_targets(g, *ranges["reference"], m, a=1.25)
        elif label == "auth":
            src = uni(*ranges["reference"], m)
            dst = _zipf_targets(g, *ranges["author"], m, a=1.2)
        else:  # pub: reference → journal ("published in"), so that
            # C -pub/(auth/-auth)+ (Q40/Q41) walks journal → its
            # references → the co-author closure, as the paper's query
            # shapes require.
            src = uni(*ranges["reference"], m)
            dst = uni(*ranges["journal"], m)
        frames.append(pd.DataFrame({"src": src.astype(np.int64), "label": label, "dst": dst.astype(np.int64)}))
    tri = pd.concat(frames, ignore_index=True).drop_duplicates(ignore_index=True)
    return tri, ranges


def uniprot_constant(tri: pd.DataFrame, label: str, seed: int = 0, end: str = "dst") -> int:
    """A well-connected constant for C-style filters: a high-degree
    endpoint of the given label (the paper picks named entities; we pick
    hubs so filtered queries have non-trivial results)."""
    sub = tri[tri["label"] == label]
    if sub.empty:
        raise ValueError(f"label {label!r} absent")
    return int(sub[end].mode().iloc[0])
