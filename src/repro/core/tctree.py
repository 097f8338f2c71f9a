"""TC-Tree: theme-community indexing and query answering (Section 6).

Build (Algorithm 4): a set-enumeration tree over patterns in item order ≺.
Level 1 decomposes C*_p(0) for every single item (one batched Spark job —
the paper parallelizes this step with OpenMP threads; here it is the same
``applyInPandas`` fan-out as everywhere else). Level k extends sibling pairs
(p_f, p_b with s_f < s_b, same prefix): the child's truss is found inside
the parents' truss intersection (Prop. 5.3) and decomposed (Thm. 6.1);
children with empty decompositions are pruned with their entire subtree
(Prop. 5.2).

The finished tree is a driver-side index — node = pattern, payload = the
decomposed linked list L_p (stored columnar, see
:class:`repro.core.decompose.PatternDecomposition`). Query (Algorithm 5)
walks the tree in breadth-first order, pruning subtrees whose stored item is
outside the query pattern or whose truss is empty at α_q; materializing
C*_p(α_q) from L_p is Equation 1, a threshold filter.
"""
from __future__ import annotations

import resource
import time
from dataclasses import dataclass, field
from typing import Dict, Iterable, List, Optional, Set, Tuple

from pyspark.sql import DataFrame

from repro.core.decompose import PatternDecomposition
from repro.core.finders import single_item_pids
from repro.core.frequencies import patterns_df, vertex_pattern_frequencies
from repro.core.mptd import decompose_batched
from repro.core.reference import Edge, pattern_items, se_tree_candidates
from repro.core.theme_network import (
    induce_from_pattern_edges,
    induce_theme_edges,
    pattern_vertices,
)
from repro.core.tcfi import intersect_parent_trusses
from repro.dbnet.generator import DatabaseNetwork


@dataclass
class TCNode:
    """One TC-Tree node: the item appended at this node, the decomposed
    maximal pattern truss L_p of the pattern on the root path, and children."""

    pid: str
    item: int
    decomp: PatternDecomposition
    children: List[str] = field(default_factory=list)


@dataclass
class BuildReport:
    wall_seconds: float
    n_nodes: int
    payload_bytes: int
    peak_rss_mb: float
    levels: List[Tuple[int, int, int]]  # (k, candidates, nodes kept)


class TCTree:
    """The theme-community index. ``nodes`` maps pid → TCNode;
    ``root_children`` are the level-1 pids in item order."""

    def __init__(self) -> None:
        self.nodes: Dict[str, TCNode] = {}
        self.root_children: List[str] = []

    # ------------------------------------------------------------------ build

    @classmethod
    def build(
        cls, net: DatabaseNetwork, max_len: Optional[int] = None
    ) -> Tuple["TCTree", BuildReport]:
        t0 = time.perf_counter()
        tree = cls()
        levels: List[Tuple[int, int, int]] = []
        spark = net.edges.sparkSession

        # Every level's decomposition is localCheckpoint-ed: the next level's
        # plan references it several times (intersection, restriction,
        # induction) and without lineage truncation the logical plan grows
        # exponentially with tree depth.
        pids = single_item_pids(net.transactions)
        pats = patterns_df(spark, pids)
        freqs = vertex_pattern_frequencies(net.transactions, pats)
        pedges = induce_theme_edges(net.edges, freqs)
        decomp_df = decompose_batched(pedges).localCheckpoint()
        qualified = tree._absorb(decomp_df, parent_of=None)
        tree.root_children = sorted(qualified, key=lambda p: pattern_items(p))
        levels.append((1, len(pids), len(qualified)))

        prev_df = decomp_df
        k = 2
        while qualified and (max_len is None or k <= max_len):
            cand_pairs = se_tree_candidates(qualified)
            if not cand_pairs:
                break
            prev_truss = prev_df.select("pid", "u", "v", "fu", "fv")
            inter = intersect_parent_trusses(prev_truss, cand_pairs)
            verts = pattern_vertices(inter)
            pats = patterns_df(spark, [c[0] for c in cand_pairs])
            freqs = vertex_pattern_frequencies(net.transactions, pats, restrict=verts)
            pedges = induce_from_pattern_edges(inter, freqs)
            decomp_df = decompose_batched(pedges).localCheckpoint()
            parent_of = {c: pf for c, pf, _pb in cand_pairs}
            new_qualified = tree._absorb(decomp_df, parent_of=parent_of)
            levels.append((k, len(cand_pairs), len(new_qualified)))
            prev_df = decomp_df
            qualified = new_qualified
            k += 1

        report = BuildReport(
            wall_seconds=time.perf_counter() - t0,
            n_nodes=len(tree.nodes),
            payload_bytes=sum(n.decomp.nbytes() for n in tree.nodes.values()),
            peak_rss_mb=resource.getrusage(resource.RUSAGE_SELF).ru_maxrss / 1024.0,
            levels=levels,
        )
        return tree, report

    def _absorb(
        self, decomp_df: DataFrame, parent_of: Optional[Dict[str, str]]
    ) -> List[str]:
        """Collect one level's decompositions into driver-side nodes; wire
        child links onto parent n_f (Algorithm 4 line 10)."""
        rows: Dict[str, List[Tuple[int, int, float]]] = {}
        for r in decomp_df.collect():
            rows.setdefault(r.pid, []).append((int(r.u), int(r.v), float(r.threshold)))
        qualified = []
        for pid in sorted(rows, key=lambda p: pattern_items(p)):
            items = pattern_items(pid)
            node = TCNode(
                pid=pid,
                item=items[-1],
                decomp=PatternDecomposition.from_rows(pid, rows[pid]),
            )
            self.nodes[pid] = node
            if parent_of is not None:
                self.nodes[parent_of[pid]].children.append(pid)
            qualified.append(pid)
        return qualified

    # ------------------------------------------------------------------ query

    @property
    def n_nodes(self) -> int:
        return len(self.nodes)

    def alpha_star(self) -> float:
        """Largest nontrivial α over the whole network: max over all nodes of
        the last linked-list threshold."""
        return max((n.decomp.alpha_star for n in self.nodes.values()), default=0.0)

    def max_depth(self) -> int:
        return max((len(pattern_items(p)) for p in self.nodes), default=0)

    def query(
        self, q: Optional[Iterable[int]] = None, alpha: float = 0.0
    ) -> Dict[str, List[Edge]]:
        """Algorithm 5: all non-empty C*_p(α) with p ⊆ q.

        ``q=None`` means q = S (QBA). Subtrees are pruned when the node's
        item is outside q, or when its truss is empty at α (Prop. 5.2).
        """
        qset: Optional[Set[int]] = None if q is None else {int(i) for i in q}
        out: Dict[str, List[Edge]] = {}
        frontier = [
            pid
            for pid in self.root_children
            if qset is None or self.nodes[pid].item in qset
        ]
        while frontier:
            nxt: List[str] = []
            for pid in frontier:
                node = self.nodes[pid]
                edges = node.decomp.truss_edges(alpha)
                if not edges:
                    continue  # Prop. 5.2: no descendant can be non-empty either
                out[pid] = edges
                nxt.extend(
                    c
                    for c in node.children
                    if qset is None or self.nodes[c].item in qset
                )
            frontier = nxt
        return out

    def sample_patterns_by_depth(self, depth: int, n: int, seed: int = 0) -> List[str]:
        """Deterministically sample up to ``n`` stored patterns of a given
        length — the paper's QBP query-pattern generator (§7.3)."""
        import random

        pids = sorted(p for p in self.nodes if len(pattern_items(p)) == depth)
        rng = random.Random(seed)
        if len(pids) <= n:
            return pids
        return rng.sample(pids, n)
