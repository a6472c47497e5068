"""yago_lite: synthetic knowledge graph standing in for Yago 2s
(DESIGN.md §4).

The real Yago has 62.6M triples over 83 predicates; the paper's queries
Q1–Q25 (Fig. 5) touch 15 of them. We generate a scaled graph with
exactly those predicates and the entity-type structure the queries
navigate:

* a place hierarchy (city → region → … → country) so ``isLocatedIn+``
  terminates at countries like Japan;
* a cyclic ``dealsWith`` digraph between countries (so isL+/dw+ grows);
* person→person relations (isMarriedTo both directions, hasChild, …);
* a zipf-skewed bipartite ``actedIn`` (so ``(actedIn/-actedIn)+`` — the
  co-actor closure of Q9/Q25 — is the largest intermediate result,
  mirroring the paper's >20M-record closures at full scale);
* a cyclic airport graph for ``isConnectedTo+``;
* ``type`` / ``rdfs:subClassOf`` for Q10/Q21.

Returns (triples, consts) where consts maps the query constants
(Japan, Kevin_Bacon, …) to node ids.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

N_COUNTRIES = 40
COUNTRY_NAMES = [
    "Argentina",
    "Japan",
    "Sweden",
    "United_States",
    "India",
    "Germany",
    "Netherlands",
]


def yago_lite(n_edges: int = 50_000, seed: int = 0) -> tuple[pd.DataFrame, dict[str, int]]:
    g = np.random.default_rng(seed)
    n_nodes = max(200, n_edges // 2)

    def block(frac: float, minimum: int = 2) -> int:
        return max(minimum, int(n_nodes * frac))

    at = 0

    def alloc(count: int) -> tuple[int, int]:
        nonlocal at
        lo, hi = at, at + count
        at = hi
        return lo, hi

    countries = alloc(N_COUNTRIES)
    regions = alloc(block(0.02))
    cities = alloc(block(0.08))
    people = alloc(block(0.56))
    films = alloc(block(0.08))
    airports = alloc(block(0.04))
    companies = alloc(block(0.03))
    classes = alloc(max(20, n_nodes // 200))

    def uni(r: tuple[int, int], size: int) -> np.ndarray:
        return g.integers(r[0], r[1], size)

    def zipf(r: tuple[int, int], size: int, a: float = 1.15) -> np.ndarray:
        k = r[1] - r[0]
        w = np.arange(1, k + 1, dtype=np.float64) ** (-a)
        w /= w.sum()
        return r[0] + g.choice(k, size=size, p=w)

    frames: list[pd.DataFrame] = []

    def emit(label: str, src: np.ndarray, dst: np.ndarray) -> None:
        frames.append(
            pd.DataFrame(
                {"src": src.astype(np.int64), "label": label, "dst": dst.astype(np.int64)}
            )
        )

    E = n_edges
    # --- place hierarchy: city → region → (region | country) ------------
    n_cities = cities[1] - cities[0]
    emit("isLocatedIn", np.arange(*cities), uni(regions, n_cities))
    n_regions = regions[1] - regions[0]
    up_is_region = g.random(n_regions) < 0.35
    reg_up = np.where(
        up_is_region,
        uni(regions, n_regions),
        uni(countries, n_regions),
    )
    # avoid trivial self loops region→itself
    reg_src = np.arange(*regions)
    reg_up = np.where(reg_up == reg_src, countries[0] + (reg_src % N_COUNTRIES), reg_up)
    emit("isLocatedIn", reg_src, reg_up)
    extra = max(1, int(E * 0.05))
    emit("isLocatedIn", uni(cities, extra), uni(regions, extra))
    # Yago also locates non-place entities (people, companies, airports)
    # in places — needed by Q11 (owns/isL+), Q15 (?a isL.. with ?a a
    # person) and Q14's city→airport hops.
    m = max(1, int(E * 0.02))
    emit("isLocatedIn", uni(people, m), uni(cities, m))
    m = max(1, int(E * 0.015))
    emit("isLocatedIn", uni(companies, m), uni(cities, m))
    m = max(1, int(E * 0.01))
    emit("isLocatedIn", uni(airports, m), uni(cities, m))

    # --- dealsWith: cyclic digraph over countries ------------------------
    m = max(N_COUNTRIES * 3, int(E * 0.01))
    emit("dealsWith", uni(countries, m), uni(countries, m))

    # --- person-centric predicates ---------------------------------------
    for label, frac in (
        ("hasChild", 0.05),
        ("influences", 0.04),
        ("hasSuccessor", 0.03),
        ("hasPredecessor", 0.03),
        ("hasAcademicAdvisor", 0.02),
    ):
        m = max(1, int(E * frac))
        emit(label, uni(people, m), uni(people, m))
    m = max(1, int(E * 0.05))
    a, b = uni(people, m), uni(people, m)
    emit("isMarriedTo", np.concatenate([a, b]), np.concatenate([b, a]))
    # Birth/residence places at mixed granularity (cities and regions),
    # as in Yago — Q23/Q24's (wasBornIn/isL/-wasBornIn)+ loops need
    # people attached one isLocatedIn hop apart.
    for label, frac in (("livesIn", 0.10), ("wasBornIn", 0.08)):
        m = max(1, int(E * frac))
        place_is_city = g.random(m) < 0.8
        places = np.where(place_is_city, uni(cities, m), uni(regions, m))
        emit(label, uni(people, m), places)

    # --- actedIn: zipf bipartite (actors × films) -------------------------
    m = max(1, int(E * 0.17))
    emit("actedIn", zipf(people, m, a=1.25), zipf(films, m, a=1.1))

    # --- transport network ---------------------------------------------------
    # isConnectedTo spans airports plus a slice of cities (real Yago
    # mixes airports/stations/cities), so Q14/Q18's join of isL+ results
    # with isConnectedTo+ sources is satisfiable.
    m = max(1, int(E * 0.10))
    n_cities_transport = max(2, (cities[1] - cities[0]) // 5)
    transport_pool = np.concatenate(
        [
            np.arange(*airports),
            g.choice(np.arange(*cities), size=n_cities_transport, replace=False),
            np.arange(countries[0], countries[0] + 5),
        ]
    )
    emit(
        "isConnectedTo",
        g.choice(transport_pool, size=m),
        g.choice(transport_pool, size=m),
    )

    # --- ownership / typing ------------------------------------------------
    m = max(1, int(E * 0.02))
    emit("owns", uni(people, m), uni(companies, m))
    m = max(1, int(E * 0.05))
    emit("type", uni(cities, m // 2 + 1), zipf(classes, m // 2 + 1, a=1.3))
    emit("type", uni(people, m // 2 + 1), zipf(classes, m // 2 + 1, a=1.3))
    n_classes = classes[1] - classes[0]
    cls_src = np.arange(classes[0] + 1, classes[1])
    cls_dst = classes[0] + (g.random(n_classes - 1) * (cls_src - classes[0])).astype(np.int64)
    emit("rdfs:subClassOf", cls_src, cls_dst)

    tri = pd.concat(frames, ignore_index=True)
    tri = tri[tri["src"] != tri["dst"]].drop_duplicates(ignore_index=True)

    consts = {name: countries[0] + i for i, name in enumerate(COUNTRY_NAMES)}
    consts["USA"] = consts["United_States"]
    acted = tri[tri["label"] == "actedIn"]
    consts["Kevin_Bacon"] = int(acted["src"].mode().iloc[0])
    conn = tri[tri["label"] == "isConnectedTo"]
    consts["Shannon_Airport"] = int(conn["src"].mode().iloc[0])
    # Q23 ends at a person whose birthplace is reachable via city→isL,
    # i.e. born in a region; prefer such a person (fall back to any).
    born = tri[tri["label"] == "wasBornIn"]
    in_region = born[(born["dst"] >= regions[0]) & (born["dst"] < regions[1])]
    consts["John_Lawrence_Toole"] = int(
        (in_region if not in_region.empty else born)["src"].iloc[0]
    )
    lives = tri[tri["label"] == "livesIn"]
    consts["Jay_Kappraff"] = int(lives["src"].iloc[0])
    typed = tri[tri["label"] == "type"]
    consts["wikicat_Capitals_in_Europe"] = int(typed["dst"].mode().iloc[0])
    return tri, consts
