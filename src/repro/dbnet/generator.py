"""Synthetic database networks.

The paper evaluates on two location-based check-in networks (Brightkite,
Gowalla), a co-author/keyword network (AMINER), and its own SYN generator
(Section 7). None of the real datasets is available offline, so this module
builds synthetic database networks whose *shape* matches Table 2:

* :func:`planted_network` — the workhorse: a graph with planted overlapping
  communities, each carrying a theme pattern that is frequent in its members'
  transaction databases. Ground truth is returned so tests can check
  recoverability.
* :func:`paper_like_network` — planted networks parameterized so that the
  #vertices / #edges / #transactions / #items ratios match Table 2's BK, GW
  and AMINER rows at a chosen scale factor.
* :func:`syn_network` — a faithful re-implementation of the paper's SYN
  procedure (preferential-attachment graph instead of the unavailable JUNG
  generator; seed vertices; BFS transaction propagation with 10% item
  mutation; |d_i| = ceil(e^{0.1 deg}), |t| = ceil(e^{0.13 deg})).
* :func:`case_study_network` — the Table-4 case study: named "authors" in six
  planted keyword-theme communities mirroring Figure 6's structure (nested
  p1 ⊂ p2 shrinkage, four hub authors in several data-mining sub-communities,
  two heavily vertex-overlapping interdisciplinary communities).

All generators are deterministic in ``seed`` and build pandas frames locally
(scales here are laptop-sized) before handing Spark the DataFrames.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, FrozenSet, List, Sequence, Set, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.reference import Edge, PyDBNet, canon

_EDGE_SCHEMA = "u long, v long"
_TX_SCHEMA = "vid long, tid long, item long"


@dataclass
class DatabaseNetwork:
    """A database network G = (V, E, D, S) as Spark DataFrames.

    ``vertices``: (vid) — every vertex, including transaction-less ones.
    ``edges``: (u, v) with u < v, deduplicated, no self-loops.
    ``transactions``: (vid, tid, item) — exploded; (vid, tid) identifies one
    transaction instance (multiset semantics), items distinct within it.
    """

    vertices: DataFrame
    edges: DataFrame
    transactions: DataFrame
    n_items: int
    name: str = "dbnet"

    def to_python(self) -> PyDBNet:
        """Collect to a driver-side PyDBNet (small networks / tests only)."""
        edges = {canon(int(r.u), int(r.v)) for r in self.edges.collect()}
        db: Dict[int, List[FrozenSet[int]]] = {}
        rows = self.transactions.collect()
        grouped: Dict[Tuple[int, int], Set[int]] = {}
        for r in rows:
            grouped.setdefault((int(r.vid), int(r.tid)), set()).add(int(r.item))
        for (vid, _tid), items in sorted(grouped.items()):
            db.setdefault(vid, []).append(frozenset(items))
        for r in self.vertices.collect():
            db.setdefault(int(r.vid), [])
        return PyDBNet(edges=edges, db=db)


@dataclass
class GroundTruth:
    """A planted community: the theme pattern and its member vertices."""

    theme: Tuple[int, ...]
    members: Tuple[int, ...]


def _frames_to_network(
    spark: SparkSession,
    n_vertices: int,
    edges: Set[Edge],
    tx_rows: List[Tuple[int, int, int]],
    n_items: int,
    name: str,
) -> DatabaseNetwork:
    vdf = spark.createDataFrame(pd.DataFrame({"vid": np.arange(n_vertices, dtype=np.int64)}))
    epdf = pd.DataFrame(sorted(edges), columns=["u", "v"]).astype(np.int64)
    edf = spark.createDataFrame(epdf, schema=_EDGE_SCHEMA)
    tpdf = pd.DataFrame(tx_rows, columns=["vid", "tid", "item"]).astype(np.int64)
    tdf = spark.createDataFrame(tpdf, schema=_TX_SCHEMA)
    return DatabaseNetwork(
        vertices=vdf, edges=edf, transactions=tdf, n_items=n_items, name=name
    )


def _random_background_edges(
    rng: np.random.Generator, n_vertices: int, n_edges: int, existing: Set[Edge]
) -> Set[Edge]:
    """Add ~n_edges uniform random edges not already present."""
    out: Set[Edge] = set()
    # Oversample then dedupe; loop until the target is met (or graph saturates).
    budget = 8
    while len(out) < n_edges and budget > 0:
        need = (n_edges - len(out)) * 2 + 8
        us = rng.integers(0, n_vertices, need)
        vs = rng.integers(0, n_vertices, need)
        for u, v in zip(us, vs):
            if u == v:
                continue
            e = canon(int(u), int(v))
            if e in existing or e in out:
                continue
            out.add(e)
            if len(out) >= n_edges:
                break
        budget -= 1
    return out


def planted_network(
    spark: SparkSession,
    *,
    n_vertices: int = 200,
    n_items: int = 40,
    n_communities: int = 4,
    community_size: int = 8,
    theme_len: int = 3,
    theme_freq: float = 0.6,
    p_intra: float = 0.9,
    n_background_edges: int | None = None,
    tx_per_vertex: int = 12,
    noise_tx_len: float = 2.0,
    seed: int = 0,
    name: str = "planted",
) -> Tuple[DatabaseNetwork, List[GroundTruth]]:
    """Database network with planted theme communities.

    Each community is a near-clique (edge prob ``p_intra``) of
    ``community_size`` vertices sharing a ``theme_len``-item theme; each
    member transaction contains the whole theme with probability
    ``theme_freq`` plus Poisson(``noise_tx_len``) noise items. Non-members
    emit noise-only transactions. Background edges connect the graph.
    Communities may overlap in vertices (members sampled with replacement
    across communities), mirroring the paper's overlapping-community setting.
    """
    rng = np.random.default_rng(seed)
    themes: List[Tuple[int, ...]] = []
    used: Set[Tuple[int, ...]] = set()
    for _ in range(n_communities):
        while True:
            t = tuple(sorted(rng.choice(n_items, theme_len, replace=False).tolist()))
            if t not in used:
                used.add(t)
                themes.append(t)
                break
    truths: List[GroundTruth] = []
    edges: Set[Edge] = set()
    member_themes: Dict[int, List[Tuple[int, ...]]] = {v: [] for v in range(n_vertices)}
    for theme in themes:
        members = rng.choice(n_vertices, min(community_size, n_vertices), replace=False)
        members = tuple(int(m) for m in members)
        truths.append(GroundTruth(theme=theme, members=members))
        for i, u in enumerate(members):
            member_themes[u].append(theme)
            for v in members[i + 1 :]:
                if u != v and rng.random() < p_intra:
                    edges.add(canon(u, v))
    if n_background_edges is None:
        n_background_edges = n_vertices  # sparse background, avg degree ~2 extra
    edges |= _random_background_edges(rng, n_vertices, n_background_edges, edges)

    tx_rows: List[Tuple[int, int, int]] = []
    for vid in range(n_vertices):
        for tid in range(tx_per_vertex):
            items: Set[int] = set()
            for theme in member_themes[vid]:
                if rng.random() < theme_freq:
                    items.update(theme)
            n_noise = int(rng.poisson(noise_tx_len))
            if not items and n_noise == 0:
                n_noise = 1  # no empty transactions
            if n_noise:
                items.update(int(i) for i in rng.integers(0, n_items, n_noise))
            for item in items:
                tx_rows.append((vid, tid, item))
    net = _frames_to_network(spark, n_vertices, edges, tx_rows, n_items, name)
    return net, truths


# Table 2 of the paper: (#vertices, #edges, #transactions, #items_total,
# #items_unique) for each real dataset. Our substitutes match these ratios
# at a scale factor.
PAPER_TABLE2 = {
    "BK": dict(v=5.1e4, e=2.1e5, tx=1.2e6, items_total=1.7e6, items_unique=1.8e3),
    "GW": dict(v=1.1e5, e=9.5e5, tx=2.0e6, items_total=3.5e6, items_unique=5.7e3),
    "AMINER": dict(v=1.1e6, e=2.6e6, tx=3.1e6, items_total=9.2e6, items_unique=1.2e4),
    "SYN": dict(v=1.0e6, e=1.0e7, tx=6.1e6, items_total=1.3e8, items_unique=1.0e4),
}


def paper_like_network(
    spark: SparkSession, dataset: str, *, sf: float = 0.01, seed: int = 7
) -> Tuple[DatabaseNetwork, List[GroundTruth]]:
    """A planted network whose Table-2 statistics match ``dataset`` scaled by
    ``sf`` (vertices/edges/transactions scale linearly; the unique-item
    vocabulary scales by sqrt(sf) so per-item pattern support survives
    down-scaling — a linear item scale-down would leave every pattern with
    paper-scale support spread over sf-scale vertices, destroying the very
    structure the algorithms mine).
    """
    cfg = PAPER_TABLE2[dataset]
    n_vertices = max(30, int(cfg["v"] * sf))
    target_edges = max(60, int(cfg["e"] * sf))
    tx_per_vertex = max(2, round(cfg["tx"] / cfg["v"]))
    avg_tx_len = cfg["items_total"] / cfg["tx"]
    n_items = max(40, int(cfg["items_unique"] * np.sqrt(sf)))

    # Community structure: enough near-cliques that intra-community edges
    # supply ~60% of the edge budget; the rest is random background.
    community_size = 8
    intra_per_comm = community_size * (community_size - 1) / 2 * 0.9
    n_communities = max(2, int(target_edges * 0.6 / intra_per_comm))
    theme_len = 3 if avg_tx_len >= 2 else 2
    ds_offset = {"BK": 101, "GW": 202, "AMINER": 303, "SYN": 404}[dataset]
    net, truths = planted_network(
        spark,
        n_vertices=n_vertices,
        n_items=n_items,
        n_communities=n_communities,
        community_size=community_size,
        theme_len=theme_len,
        theme_freq=0.55,
        p_intra=0.9,
        n_background_edges=max(0, int(target_edges - n_communities * intra_per_comm)),
        tx_per_vertex=tx_per_vertex,
        noise_tx_len=max(0.4, avg_tx_len - 0.55 * theme_len),
        seed=seed + ds_offset,
        name=f"{dataset}@sf={sf}",
    )
    return net, truths


def _ba_graph(rng: np.random.Generator, n: int, m: int) -> Set[Edge]:
    """Barabási–Albert preferential attachment: each new vertex attaches to
    ``m`` existing vertices sampled proportionally to degree. Stands in for
    the paper's JUNG-generated graph (JUNG is unavailable offline); both
    yield heavy-tailed degree distributions."""
    edges: Set[Edge] = set()
    targets = list(range(m))  # initial clique-ish seed
    repeated: List[int] = []
    for i, j in [(a, b) for a in range(m) for b in range(a + 1, m)]:
        edges.add(canon(i, j))
        repeated += [i, j]
    for v in range(m, n):
        chosen: Set[int] = set()
        while len(chosen) < m:
            if repeated and rng.random() < 0.9:
                chosen.add(int(repeated[rng.integers(0, len(repeated))]))
            else:
                chosen.add(int(rng.integers(0, v)))
        for t in chosen:
            edges.add(canon(v, t))
            repeated += [v, t]
    return edges


def syn_network(
    spark: SparkSession,
    *,
    n_vertices: int = 1000,
    m_attach: int = 5,
    n_items: int = 200,
    seed_frac: float = 0.02,
    seed_tx_len: int = 4,
    mutation: float = 0.1,
    deg_cap: int = 40,
    seed: int = 11,
) -> DatabaseNetwork:
    # NOTE on deg_cap: the exponential transaction formulas make hub
    # vertices' transactions span most of a small item universe, which makes
    # every item pair frequent everywhere and blows the pattern lattice up
    # combinatorially (the paper's full-scale SYN tree has 1.3e8 nodes).
    # Mining/indexing jobs at laptop scale pass a lower cap (~25).
    """The paper's SYN procedure (Section 7) at reduced scale.

    1. Generate a graph (preferential attachment, ``m_attach`` edges/vertex).
    2. Pick ``seed_frac`` of vertices as seeds; give each random itemset
       transactions of length ``seed_tx_len``.
    3. BFS from the seeds; every non-seed vertex samples its transactions
       from already-populated neighbours and mutates 10% of items uniformly.
    4. Vertex v gets ceil(e^{0.1 deg(v)}) transactions of length
       ceil(e^{0.13 deg(v)}) (degree capped at ``deg_cap`` so small-scale
       runs stay finite; the paper ran the uncapped formula at 1M vertices).
    """
    rng = np.random.default_rng(seed)
    edges = _ba_graph(rng, n_vertices, m_attach)
    adj: Dict[int, List[int]] = {v: [] for v in range(n_vertices)}
    for u, v in edges:
        adj[u].append(v)
        adj[v].append(u)
    deg = {v: len(a) for v, a in adj.items()}

    def n_tx_of(v: int) -> int:
        return int(np.ceil(np.exp(0.1 * min(deg[v], deg_cap))))

    def tx_len_of(v: int) -> int:
        # A transaction is an item *set*: its length can never exceed the
        # item universe, so the exponential formula is clamped to n_items
        # (hub vertices would otherwise demand impossible lengths at small
        # scale — the paper ran this formula with |S| = 10^4).
        return min(int(np.ceil(np.exp(0.13 * min(deg[v], deg_cap)))), n_items)

    n_seeds = max(1, int(n_vertices * seed_frac))
    seeds = rng.choice(n_vertices, n_seeds, replace=False).tolist()
    db: Dict[int, List[Set[int]]] = {}
    for s in seeds:
        # Seeds sample random itemsets; their transaction count follows the
        # same degree formula as every other vertex (§7's "multiple itemsets").
        db[int(s)] = [
            set(rng.choice(n_items, min(seed_tx_len, n_items), replace=False).tolist())
            for _ in range(n_tx_of(int(s)))
        ]
    # BFS propagation from the seeds.
    from collections import deque

    q = deque(int(s) for s in seeds)
    visited = set(db)
    while q:
        v = q.popleft()
        for w in adj[v]:
            if w in visited:
                continue
            visited.add(w)
            donors = [x for x in adj[w] if x in db and db[x]]
            txs: List[Set[int]] = []
            want_n, want_len = n_tx_of(w), tx_len_of(w)
            for _ in range(want_n):
                if donors:
                    donor = donors[int(rng.integers(0, len(donors)))]
                    base = set(db[donor][int(rng.integers(0, len(db[donor])))])
                else:
                    base = set(rng.choice(n_items, min(want_len, n_items), replace=False).tolist())
                # mutate ~10% of items
                base = set(base)
                n_mut = max(0, int(round(mutation * len(base))))
                if n_mut:
                    drop = rng.choice(sorted(base), n_mut, replace=False)
                    base -= set(int(d) for d in drop)
                    base |= {int(i) for i in rng.integers(0, n_items, n_mut)}
                # pad/trim toward the target length
                while len(base) < want_len:
                    base.add(int(rng.integers(0, n_items)))
                txs.append(base)
            db[w] = txs
            q.append(w)
    # isolated unvisited vertices (none for connected BA, but be safe)
    for v in range(n_vertices):
        db.setdefault(v, [set(rng.choice(n_items, 2, replace=False).tolist())])

    tx_rows = [
        (vid, tid, int(item))
        for vid, txs in db.items()
        for tid, t in enumerate(txs)
        for item in t
    ]
    return _frames_to_network(spark, n_vertices, edges, tx_rows, n_items, "SYN")


# ---------------------------------------------------------------------------
# Case study (Table 4 / Figure 6)
# ---------------------------------------------------------------------------

CASE_STUDY_THEMES: Dict[str, Tuple[str, ...]] = {
    "p1": ("data mining", "sequential pattern"),
    "p2": ("data mining", "sequential pattern", "intrusion detection"),
    "p3": ("data mining", "search space", "complete set", "pattern mining"),
    "p4": ("data mining", "sensitive information", "privacy protection"),
    "p5": (
        "principal component analysis",
        "linear discriminant analysis",
        "dimensionality reduction",
        "component analysis",
    ),
    "p6": ("image retrieval", "image database", "relevance feedback", "semantic gap"),
}

# Hub "authors" standing in for the four senior researchers of the paper's
# case study (we do not attach real names to synthetic data): hub_A appears
# in the p1/p2 communities, hub_B in p1/p3/p5, hub_C in p1/p3/p4/p6, hub_D in
# p1/p4; bridge_1/bridge_2 appear in both p5 and p6 (the heavy vertex overlap
# of Figures 6(e)-(f)).
_CASE_MEMBERSHIP: Dict[str, Tuple[str, ...]] = {
    "p1": ("hub_A", "hub_B", "hub_C", "hub_D"),
    "p2": ("hub_A", "hub_B"),
    "p3": ("hub_B", "hub_C"),
    "p4": ("hub_C", "hub_D"),
    "p5": ("hub_B", "bridge_1", "bridge_2"),
    "p6": ("hub_C", "bridge_1", "bridge_2"),
}


def case_study_network(
    spark: SparkSession, *, fill_per_community: int = 5, n_noise_authors: int = 40, seed: int = 3
) -> Tuple[DatabaseNetwork, Dict[str, Tuple[int, ...]], Dict[int, str], Dict[int, str]]:
    """AMINER-style named network with the six Table-4 themes planted.

    Returns ``(network, theme_items, item_names, author_names)`` where
    ``theme_items[pk]`` is the planted pattern as item ids, ``item_names``
    maps item id → keyword, ``author_names`` maps vid → author label.
    """
    rng = np.random.default_rng(seed)
    keywords: List[str] = sorted({kw for t in CASE_STUDY_THEMES.values() for kw in t})
    n_noise_kw = 30
    keywords += [f"kw_noise_{i}" for i in range(n_noise_kw)]
    kw_id = {k: i for i, k in enumerate(keywords)}
    item_names = {i: k for k, i in kw_id.items()}

    authors: List[str] = ["hub_A", "hub_B", "hub_C", "hub_D", "bridge_1", "bridge_2"]
    members: Dict[str, List[str]] = {}
    for pk in CASE_STUDY_THEMES:
        mem = list(_CASE_MEMBERSHIP[pk])
        for i in range(fill_per_community):
            a = f"{pk}_author_{i}"
            authors.append(a)
            mem.append(a)
        # p2's community must be a subset of p1's (Theorem 5.1 shrinkage demo)
        members[pk] = mem
    members["p1"] = members["p1"] + members["p2"][2:]  # p2 fills co-author within p1
    authors += [f"noise_{i}" for i in range(n_noise_authors)]
    aid = {a: i for i, a in enumerate(dict.fromkeys(authors))}
    author_names = {i: a for a, i in aid.items()}
    n_vertices = len(aid)

    edges: Set[Edge] = set()
    member_themes: Dict[int, List[Tuple[int, ...]]] = {v: [] for v in range(n_vertices)}
    theme_items: Dict[str, Tuple[int, ...]] = {}
    for pk, theme in CASE_STUDY_THEMES.items():
        items = tuple(sorted(kw_id[k] for k in theme))
        theme_items[pk] = items
        vids = [aid[a] for a in members[pk]]
        for i, u in enumerate(vids):
            member_themes[u].append(items)
            for v in vids[i + 1 :]:
                edges.add(canon(u, v))  # co-author clique per community
    # sparse noise edges
    edges |= _random_background_edges(rng, n_vertices, n_vertices // 2, edges)

    tx_rows: List[Tuple[int, int, int]] = []
    n_items = len(keywords)
    for vid in range(n_vertices):
        themes = member_themes[vid]
        n_tx = 10 + 4 * len(themes)
        for tid in range(n_tx):
            items: Set[int] = set()
            if themes and rng.random() < 0.9:
                # each "paper" is about one of the author's themes
                t = themes[int(rng.integers(0, len(themes)))]
                if rng.random() < 0.75:
                    items.update(t)
                else:
                    items.update(int(i) for i in rng.choice(t, max(1, len(t) - 1), replace=False))
            items.update(int(i) for i in rng.integers(0, n_items, int(rng.poisson(1.5))))
            if not items:
                items.add(int(rng.integers(0, n_items)))
            for item in items:
                tx_rows.append((vid, tid, item))
    net = _frames_to_network(spark, n_vertices, edges, tx_rows, n_items, "CASE")
    return net, theme_items, item_names, author_names
