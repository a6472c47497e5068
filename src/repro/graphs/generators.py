"""Synthetic graph generators (paper §V-B, Table I).

All generators are deterministic in ``seed`` and return pandas
DataFrames — either plain edge lists ``(src, dst)`` or labeled triples
``(src, label, dst)`` with int64 node ids.

Model notes (see DESIGN.md §4):

* ``rnd_n_p`` — Erdos-Rényi: each unordered pair {i,j} is an edge with
  probability p, directed low→high, then node ids are shuffled by a
  random permutation. The low→high orientation (an acyclic tournament
  direction) is what matches the paper's Table I: rnd_10k_0.001 has
  50,119 edges = C(n,2)·p and a TC of 5.7M = 5.7 % of n², which only an
  acyclic-leaning generator produces (a cyclic giant-SCC digraph at
  mean degree 10 would have a ~99 % closure).
* ``tree_n`` — random recursive tree, edges parent→child (TC size
  ≈ n·ln n, matching tree_10's 84,615 ≈ 10⁴·ln 10⁴ / 1.09).
* ``pa_graph`` — preferential attachment, stands in for the SNAP
  social graphs (heavy-tailed degrees).
* ``add_labels`` — uniformly assigns k labels to an edge list (used by
  the concatenated-closure and aⁿbⁿ experiments, paper §V-B "other
  graphs derived from rnd_p_n").
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def erdos_renyi(n: int, p: float, seed: int = 0) -> pd.DataFrame:
    """rnd_n_p: C(n,2)·p expected edges, acyclic (see module docstring)."""
    g = _rng(seed)
    srcs: list[np.ndarray] = []
    dsts: list[np.ndarray] = []
    for i in range(n - 1):
        js = np.nonzero(g.random(n - i - 1) < p)[0] + i + 1
        if len(js):
            srcs.append(np.full(len(js), i, dtype=np.int64))
            dsts.append(js.astype(np.int64))
    src = np.concatenate(srcs) if srcs else np.array([], dtype=np.int64)
    dst = np.concatenate(dsts) if dsts else np.array([], dtype=np.int64)
    perm = g.permutation(n).astype(np.int64)
    return pd.DataFrame({"src": perm[src], "dst": perm[dst]})


def random_tree(n: int, seed: int = 0) -> pd.DataFrame:
    """tree_n: node i+1 attaches under a uniformly random earlier node."""
    g = _rng(seed)
    child = np.arange(1, n, dtype=np.int64)
    # parent of node i is uniform over [0, i)
    parent = (g.random(n - 1) * child).astype(np.int64)
    return pd.DataFrame({"src": parent, "dst": child})


def pa_graph(n: int, m: int, seed: int = 0) -> pd.DataFrame:
    """Preferential attachment (Barabási–Albert flavoured): each new
    node sends m edges to degree-biased earlier targets. Directed
    new→old; heavy-tailed in-degree like the SNAP graphs."""
    g = _rng(seed)
    m0 = min(m, n)
    # `pool` holds one entry per edge endpoint, so sampling an index
    # uniformly is degree-proportional sampling (classic BA trick).
    pool = np.empty(m0 + 2 * n * m, dtype=np.int64)
    pool[:m0] = np.arange(m0)
    fill = m0
    src: list[int] = []
    dst: list[int] = []
    for v in range(m0, n):
        idx = (g.random(m) * fill).astype(np.int64)
        for t in set(int(pool[i]) for i in idx):
            src.append(v)
            dst.append(t)
            pool[fill] = t
            fill += 1
        pool[fill] = v
        fill += 1
    return pd.DataFrame(
        {"src": np.array(src, dtype=np.int64), "dst": np.array(dst, dtype=np.int64)}
    ).drop_duplicates(ignore_index=True)


def add_labels(edges: pd.DataFrame, labels: list[str], seed: int = 0) -> pd.DataFrame:
    """Random label per edge → (src, label, dst) triples (paper §V-B:
    'graphs derived from rnd_p_n by adding a set of predefined labels
    randomly')."""
    g = _rng(seed)
    out = edges.copy()
    out["label"] = g.choice(np.array(labels, dtype=object), len(edges))
    return out[["src", "label", "dst"]].drop_duplicates(ignore_index=True)


def snap_lite(which: str, seed: int = 0) -> pd.DataFrame:
    """Scaled-down stand-ins for the SNAP graphs of Table I.

    Sizes are ~1/10 linear scale (1/100 edges) of the originals, with
    preferential-attachment topology (heavy-tailed degrees):

    ========== ============= ============== ===============
    name        paper edges   paper nodes    lite (edges≈)
    facebook    88,234        4,039          ~2k on 400
    reddit      858,490       55,863         ~11k on 5.6k
    dblp        1,049,866     317,080        ~13k on 31k
    livejournal 68,993,773    4,847,571      ~24k on 12k
    ========== ============= ============== ===============
    """
    params = {
        "facebook": (400, 6),
        "reddit": (5600, 2),
        "dblp": (31000, 1),
        "livejournal": (12000, 2),
    }
    if which not in params:
        raise KeyError(f"unknown snap graph {which!r}; options {sorted(params)}")
    n, m = params[which]
    return pa_graph(n, m, seed=seed)


def edges_to_triples(edges: pd.DataFrame, label: str = "e") -> pd.DataFrame:
    """Lift a plain edge list to single-label triples."""
    out = edges.copy()
    out["label"] = label
    return out[["src", "label", "dst"]]
