"""Dataset registry: scaled stand-ins for every row of paper Table I.

Each entry pairs our generator (deterministic seed) with the paper's
reported numbers so jobs/benchmarks can print paper-vs-measured tables
(EXPERIMENTS.md). Scaling is ~1/10 linear (1/100 quadratic) for the
synthetics and 1/100–1/1000 for the large real graphs; DESIGN.md §4
records why each substitution preserves the relevant behaviour.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Optional

import pandas as pd

from .generators import erdos_renyi, random_tree, snap_lite
from .uniprot import uniprot
from .yago import yago_lite


@dataclass(frozen=True)
class DatasetSpec:
    name: str  # our (scaled) name
    paper_name: str
    paper_edges: Optional[int]
    paper_nodes: Optional[int]
    paper_tc: Optional[int]  # None where the paper prints "-" or omits
    make: Callable[[], pd.DataFrame]  # returns (src,dst) edge list
    compute_tc: bool = True


def _uniprot_edges(n: int, seed: int) -> pd.DataFrame:
    tri, _ = uniprot(n, seed=seed)
    return tri[["src", "dst"]].drop_duplicates(ignore_index=True)


def _yago_edges(n: int, seed: int) -> pd.DataFrame:
    tri, _ = yago_lite(n, seed=seed)
    return tri[["src", "dst"]].drop_duplicates(ignore_index=True)


TABLE1: list[DatasetSpec] = [
    DatasetSpec("yago_lite_60k", "Yago", 62_643_951, 42_832_856, None,
                lambda: _yago_edges(60_000, 0), compute_tc=False),
    DatasetSpec("facebook_lite", "Facebook", 88_234, 4_039, None,
                lambda: snap_lite("facebook", 0), compute_tc=False),
    DatasetSpec("reddit_lite", "Reddit", 858_490, 55_863, None,
                lambda: snap_lite("reddit", 0), compute_tc=False),
    DatasetSpec("dblp_lite", "DBLP", 1_049_866, 317_080, None,
                lambda: snap_lite("dblp", 0), compute_tc=False),
    DatasetSpec("livejournal_lite", "Live Journal", 68_993_773, 4_847_571, None,
                lambda: snap_lite("livejournal", 0), compute_tc=False),
    DatasetSpec("rnd_1k_0.01", "rnd_10k_0.001", 50_119, 10_000, 5_718_306,
                lambda: erdos_renyi(1_000, 0.01, 1)),
    DatasetSpec("rnd_2k_0.01", "rnd_20k_0.001", 199_871, 20_000, 81_732_096,
                lambda: erdos_renyi(2_000, 0.01, 2)),
    DatasetSpec("rnd_3k_0.01", "rnd_30k_0.001", 450_904, 30_000, 255_097_974,
                lambda: erdos_renyi(3_000, 0.01, 3)),
    DatasetSpec("rnd_1k_0.05", "rnd_10k_0.005", 249_791, 10_000, 39_113_982,
                lambda: erdos_renyi(1_000, 0.05, 4)),
    DatasetSpec("rnd_5k_0.01", "rnd_50k_0.001", 1_250_922, 50_000, 906_630_823,
                lambda: erdos_renyi(5_000, 0.01, 5)),
    DatasetSpec("tree_1k", "tree_10", 9_999, 10_000, 84_615,
                lambda: random_tree(1_000, 6)),
    DatasetSpec("tree_15k", "tree_150", 149_999, 150_000, 1_775_161,
                lambda: random_tree(15_000, 7)),
    DatasetSpec("uniprot_10k", "uniprot_1M", 1_000_443, 1_017_828, None,
                lambda: _uniprot_edges(10_000, 8), compute_tc=False),
    DatasetSpec("uniprot_50k", "uniprot_5M", 5_001_427, 5_081_402, None,
                lambda: _uniprot_edges(50_000, 9), compute_tc=False),
    DatasetSpec("uniprot_100k", "uniprot_10M", 10_001_920, 10_153_411, None,
                lambda: _uniprot_edges(100_000, 10), compute_tc=False),
]


def by_name(name: str) -> DatasetSpec:
    for spec in TABLE1:
        if spec.name == name:
            return spec
    raise KeyError(f"unknown dataset {name!r}")
