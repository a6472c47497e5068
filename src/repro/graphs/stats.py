"""Exact graph statistics for Table I: nodes, edges, transitive-closure
size.

TC size is computed exactly without materializing the closure:
Tarjan SCC condensation (iterative, handles cycles), then reachability
over the condensation DAG with packed numpy bitsets in reverse
topological order. The pair count is

    Σ_i |C_i| · Σ_{C_j strictly reachable from C_i} |C_j|
      + Σ_{|C_i| ≥ 2} |C_i|²

(counting ordered pairs (u,v) with a path of length ≥ 1; nodes inside a
non-trivial SCC reach themselves).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass(frozen=True)
class GraphSummary:
    nodes: int
    edges: int
    tc_size: int


def sccs(n: int, adj: list[list[int]]) -> tuple[np.ndarray, int]:
    """Iterative Tarjan; returns (component id per node, #components).
    Component ids are in reverse topological order (sources last)."""
    index = np.full(n, -1, dtype=np.int64)
    low = np.zeros(n, dtype=np.int64)
    on_stack = np.zeros(n, dtype=bool)
    stack: list[int] = []
    comp = np.full(n, -1, dtype=np.int64)
    counter = 0
    ncomp = 0
    for root in range(n):
        if index[root] != -1:
            continue
        work = [(root, 0)]
        while work:
            v, pi = work[-1]
            if pi == 0:
                index[v] = low[v] = counter
                counter += 1
                stack.append(v)
                on_stack[v] = True
            recurse = False
            for i in range(pi, len(adj[v])):
                w = adj[v][i]
                if index[w] == -1:
                    work[-1] = (v, i + 1)
                    work.append((w, 0))
                    recurse = True
                    break
                if on_stack[w]:
                    low[v] = min(low[v], index[w])
            if recurse:
                continue
            if low[v] == index[v]:
                while True:
                    w = stack.pop()
                    on_stack[w] = False
                    comp[w] = ncomp
                    if w == v:
                        break
                ncomp += 1
            work.pop()
            if work:
                u, _ = work[-1]
                low[u] = min(low[u], low[v])
    return comp, ncomp


def tc_size(edges: pd.DataFrame) -> int:
    """Exact |TC| of a (src,dst) edge list (ordered pairs, path len ≥ 1)."""
    if edges.empty:
        return 0
    nodes = pd.unique(pd.concat([edges["src"], edges["dst"]], ignore_index=True))
    remap = {int(v): i for i, v in enumerate(nodes)}
    n = len(nodes)
    s = edges["src"].map(remap).to_numpy()
    d = edges["dst"].map(remap).to_numpy()
    adj: list[list[int]] = [[] for _ in range(n)]
    for a, b in zip(s, d):
        adj[int(a)].append(int(b))
    comp, k = sccs(n, adj)
    sizes = np.bincount(comp, minlength=k).astype(np.int64)
    # Condensation adjacency (Tarjan ids: edge u→v ⇒ comp[u] ≥ comp[v],
    # so iterating components 0..k-1 is already reverse-topological).
    cadj: list[set[int]] = [set() for _ in range(k)]
    for a, b in zip(s, d):
        ca, cb = int(comp[a]), int(comp[b])
        if ca != cb:
            cadj[ca].add(cb)
    words = (k + 63) // 64
    reach = np.zeros((k, words), dtype=np.uint64)
    weight = np.zeros(k, dtype=np.int64)  # Σ sizes of strictly-reachable comps
    one = np.uint64(1)
    for c in range(k):  # children have smaller ids → already computed
        r = reach[c]
        for ch in cadj[c]:
            r |= reach[ch]
            r[ch >> 6] |= one << np.uint64(ch & 63)
        # weighted popcount, vectorized: bit i (little-endian) = component i
        bits = np.unpackbits(r.view(np.uint8), bitorder="little")[:k]
        weight[c] = int(bits @ sizes)
    total = int(np.dot(sizes, weight))
    total += int(sum(int(s_) * int(s_) for s_ in sizes if s_ >= 2))
    return total


def summarize(edges: pd.DataFrame, with_tc: bool = True) -> GraphSummary:
    nodes = int(pd.concat([edges["src"], edges["dst"]]).nunique())
    return GraphSummary(
        nodes=nodes,
        edges=int(len(edges.drop_duplicates())),
        tc_size=tc_size(edges) if with_tc else -1,
    )
