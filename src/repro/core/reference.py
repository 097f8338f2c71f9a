"""Pure-Python exact reference implementation of the paper's algorithms.

This module is the correctness oracle for the Spark pipeline. It ports,
line for line where possible, the paper's pseudo-code:

* ``edge_cohesions``    — Definition 3.1,
* ``mptd``              — Algorithm 1 (queue-based Maximal Pattern Truss
  Detector),
* ``decompose``         — Theorem 6.1 / Section 6.1 (maximal-pattern-truss
  decomposition into per-edge removal thresholds; Eq. 1 is then a filter),
* ``frequent_patterns`` — the per-vertex Apriori enumeration used by the
  TCS baseline (Section 4.2),
* ``brute_force_trusses`` — enumerates *every* pattern over the item
  universe and runs MPTD, the gold standard TCS/TCFA/TCFI and the TC-Tree
  are compared against in tests.

Everything here is driver-side Python over plain dicts/sets — intended for
small graphs only. The Spark modules reuse ``mptd``/``decompose`` inside
``applyInPandas`` groups (one pattern's theme subgraph per group), which is
where these functions also run at scale.
"""
from __future__ import annotations

from collections import Counter, defaultdict, deque
from dataclasses import dataclass, field
from itertools import combinations
from typing import Dict, FrozenSet, Iterable, List, Mapping, Sequence, Set, Tuple

Edge = Tuple[int, int]


def canon(u: int, v: int) -> Edge:
    """Canonical undirected edge representation (min, max)."""
    return (u, v) if u < v else (v, u)


def pattern_id(items: Iterable[int]) -> str:
    """Canonical pattern id: sorted item ids joined by '|' (e.g. '1|3|7')."""
    return "|".join(str(i) for i in sorted(set(int(i) for i in items)))


def pattern_items(pid: str) -> Tuple[int, ...]:
    """Inverse of :func:`pattern_id`."""
    return tuple(int(s) for s in pid.split("|")) if pid else ()


@dataclass
class PyDBNet:
    """Driver-side database network: canonical edge set + per-vertex
    transaction database (a list of item-frozensets; the list is a multiset —
    duplicates are distinct transactions)."""

    edges: Set[Edge]
    db: Dict[int, List[FrozenSet[int]]]

    @property
    def vertices(self) -> Set[int]:
        vs = set(self.db)
        for u, v in self.edges:
            vs.add(u)
            vs.add(v)
        return vs

    @property
    def items(self) -> Set[int]:
        return {i for txs in self.db.values() for t in txs for i in t}


def vertex_frequencies(
    db: Mapping[int, Sequence[FrozenSet[int]]], p: Iterable[int]
) -> Dict[int, float]:
    """``f_i(p)`` for every vertex with positive frequency: the proportion of
    the vertex's transactions (multiset semantics) containing all of ``p``."""
    ps = frozenset(int(i) for i in p)
    out: Dict[int, float] = {}
    for vid, txs in db.items():
        if not txs:
            continue
        n = sum(1 for t in txs if ps <= t)
        if n:
            out[vid] = n / len(txs)
    return out


def theme_subgraph(edges: Iterable[Edge], freqs: Mapping[int, float]) -> Set[Edge]:
    """Edges of the theme network G_p: both endpoints have f_i(p) > 0."""
    return {canon(u, v) for u, v in edges if freqs.get(u, 0.0) > 0 and freqs.get(v, 0.0) > 0}


def _adjacency(edges: Iterable[Edge]) -> Dict[int, Set[int]]:
    adj: Dict[int, Set[int]] = defaultdict(set)
    for u, v in edges:
        adj[u].add(v)
        adj[v].add(u)
    return adj


def edge_cohesions(edges: Iterable[Edge], freqs: Mapping[int, float]) -> Dict[Edge, float]:
    """Definition 3.1: eco_ij = sum over triangles ijk of min(f_i, f_j, f_k)."""
    edges = {canon(u, v) for u, v in edges}
    adj = _adjacency(edges)
    eco: Dict[Edge, float] = {}
    for u, v in edges:
        common = adj[u] & adj[v]
        eco[(u, v)] = sum(min(freqs[u], freqs[v], freqs[w]) for w in common)
    return eco


def mptd(edges: Iterable[Edge], freqs: Mapping[int, float], alpha: float) -> Set[Edge]:
    """Algorithm 1 (MPTD): peel edges with cohesion <= alpha until fixpoint.

    Returns the edge set of the maximal pattern truss C*_p(alpha). The input
    must already be a theme subgraph (all endpoints have freqs entries).
    """
    live = {canon(u, v) for u, v in edges}
    adj = _adjacency(live)
    eco = edge_cohesions(live, freqs)
    q: deque = deque(e for e, c in eco.items() if c <= alpha)
    while q:
        e = q.popleft()
        if e not in live:
            continue  # already removed via an earlier queue entry
        u, v = e
        for w in adj[u] & adj[v]:
            m = min(freqs[u], freqs[v], freqs[w])
            for e2 in (canon(u, w), canon(v, w)):
                eco[e2] -= m
                if eco[e2] <= alpha:
                    q.append(e2)
        live.discard(e)
        adj[u].discard(v)
        adj[v].discard(u)
    return live


def decompose(edges: Iterable[Edge], freqs: Mapping[int, float]) -> Dict[Edge, float]:
    """Section 6.1 decomposition of C*_p(0) into per-edge removal thresholds.

    Returns ``{edge: alpha_k}`` for every edge of C*_p(0), where alpha_k is
    the threshold of the decomposition step removing the edge (the edge
    belongs to R_p(alpha_k)). Eq. 1 then reads:
    ``E*_p(alpha) = {e : alpha_k(e) > alpha}`` — see :func:`truss_at`.
    """
    current = mptd(edges, freqs, 0.0)
    levels: Dict[Edge, float] = {}
    while current:
        eco = edge_cohesions(current, freqs)
        beta = min(eco.values())  # alpha_k = min edge cohesion of C*(alpha_{k-1})
        nxt = mptd(current, freqs, beta)
        for e in current - nxt:
            levels[e] = beta
        current = nxt
    return levels


def truss_at(levels: Mapping[Edge, float], alpha: float) -> Set[Edge]:
    """Equation 1: reconstruct E*_p(alpha) from the decomposition."""
    return {e for e, a in levels.items() if a > alpha}


def connected_components(edges: Iterable[Edge]) -> List[Set[int]]:
    """Maximal connected vertex sets of an edge set (union-find). These are
    the theme communities of a maximal pattern truss (Definition 3.5)."""
    parent: Dict[int, int] = {}

    def find(x: int) -> int:
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for u, v in edges:
        parent.setdefault(u, u)
        parent.setdefault(v, v)
        ru, rv = find(u), find(v)
        if ru != rv:
            parent[ru] = rv
    groups: Dict[int, Set[int]] = defaultdict(set)
    for x in parent:
        groups[find(x)].add(x)
    return list(groups.values())


def frequent_patterns(
    transactions: Sequence[FrozenSet[int]], min_freq: float, max_len: int = 5
) -> Dict[str, float]:
    """Per-vertex Apriori: all patterns with frequency strictly > ``min_freq``
    in one transaction database (TCS Section 4.2 candidate enumeration).

    Returns ``{pattern_id: frequency}``. ``max_len`` bounds enumeration depth
    (the paper's TCS has no explicit bound; the bound is a practicality guard
    and is set above the longest pattern of interest in all experiments).
    """
    n = len(transactions)
    if n == 0:
        return {}
    counts = Counter(i for t in transactions for i in t)
    level = {frozenset((i,)) for i, c in counts.items() if c / n > min_freq}
    out = {pattern_id(p): counts[next(iter(p))] / n for p in level}
    k = 2
    while level and k <= max_len:
        # Apriori join: unions of size k whose (k-1)-subsets are all frequent.
        cands = set()
        lv = sorted(level, key=sorted)
        for a, b in combinations(lv, 2):
            u = a | b
            if len(u) == k and all(frozenset(c) in level for c in combinations(u, k - 1)):
                cands.add(u)
        nxt = set()
        for c in cands:
            s = sum(1 for t in transactions if c <= t)
            if s / n > min_freq:
                nxt.add(c)
                out[pattern_id(c)] = s / n
        level = nxt
        k += 1
    return out


def apriori_candidates(qualified: Iterable[str]) -> List[str]:
    """Algorithm 2: length-k candidates from length-(k-1) qualified patterns
    (prefix join + full sub-pattern check)."""
    qual = [tuple(sorted(pattern_items(p))) for p in qualified]
    if not qual:
        return []
    k = len(qual[0]) + 1
    qset = {frozenset(p) for p in qual}
    by_prefix: Dict[Tuple[int, ...], List[int]] = defaultdict(list)
    for p in qual:
        by_prefix[p[:-1]].append(p[-1])
    cands = []
    for prefix, lasts in by_prefix.items():
        lasts.sort()
        for a, b in combinations(lasts, 2):
            u = prefix + (a, b)
            if all(frozenset(u[:i] + u[i + 1 :]) in qset for i in range(k)):
                cands.append(pattern_id(u))
    return sorted(cands)


def apriori_candidate_pairs(qualified: Iterable[str]) -> List[Tuple[str, str, str]]:
    """Algorithm 2 candidates *with* the generating parent pair, for TCFI.

    Returns ``(child_pid, parent1_pid, parent2_pid)`` where the parents share
    a (k-2)-prefix and the full sub-pattern check passed; Proposition 5.3
    bounds the child's truss by the parents' truss intersection.
    """
    qual = [tuple(sorted(pattern_items(p))) for p in qualified]
    if not qual:
        return []
    k = len(qual[0]) + 1
    qset = {frozenset(p) for p in qual}
    by_prefix: Dict[Tuple[int, ...], List[int]] = defaultdict(list)
    for p in qual:
        by_prefix[p[:-1]].append(p[-1])
    out = []
    for prefix, lasts in by_prefix.items():
        lasts.sort()
        for a, b in combinations(lasts, 2):
            u = prefix + (a, b)
            if all(frozenset(u[:i] + u[i + 1 :]) in qset for i in range(k)):
                out.append(
                    (pattern_id(u), pattern_id(prefix + (a,)), pattern_id(prefix + (b,)))
                )
    return sorted(out)


def se_tree_candidates(qualified: Iterable[str]) -> List[Tuple[str, str, str]]:
    """Algorithm 4's child generation: siblings (same (k-1)-prefix) p_f, p_b
    with last items s_f < s_b yield child p_f ∪ {s_b}.

    Returns ``(child_pid, parent_f_pid, parent_b_pid)`` triples; the two
    parents are the pair whose truss intersection bounds the child's truss
    (Proposition 5.3).
    """
    by_prefix: Dict[Tuple[int, ...], List[int]] = defaultdict(list)
    for p in qualified:
        t = tuple(sorted(pattern_items(p)))
        by_prefix[t[:-1]].append(t[-1])
    out = []
    for prefix, lasts in by_prefix.items():
        lasts.sort()
        for a, b in combinations(lasts, 2):
            out.append(
                (
                    pattern_id(prefix + (a, b)),
                    pattern_id(prefix + (a,)),
                    pattern_id(prefix + (b,)),
                )
            )
    return sorted(out)


def brute_force_trusses(
    net: PyDBNet, alpha: float, max_len: int | None = None
) -> Dict[str, Set[Edge]]:
    """Gold standard: run MPTD on the theme network of *every* pattern over
    the item universe (up to ``max_len``), keeping non-empty trusses.

    Exponential in |S| — use only on tiny networks in tests.
    """
    items = sorted(net.items)
    max_len = max_len or len(items)
    out: Dict[str, Set[Edge]] = {}
    for k in range(1, max_len + 1):
        found_any = False
        for combo in combinations(items, k):
            f = vertex_frequencies(net.db, combo)
            sub = theme_subgraph(net.edges, f)
            t = mptd(sub, f, alpha)
            if t:
                out[pattern_id(combo)] = t
                found_any = True
        if not found_any:
            break  # pattern anti-monotonicity (Prop 5.2): no longer pattern qualifies
    return out


@dataclass
class FinderStats:
    """Per-level bookkeeping shared by the reference and Spark finders."""

    candidates_per_level: List[int] = field(default_factory=list)
    mptd_calls: int = 0
    qualified_per_level: List[int] = field(default_factory=list)


def tcfa_reference(net: PyDBNet, alpha: float, max_len: int = 8) -> Dict[str, Set[Edge]]:
    """Driver-side TCFA (Algorithm 3) over a PyDBNet, for oracle tests."""
    out: Dict[str, Set[Edge]] = {}
    qualified: List[str] = []
    for i in sorted(net.items):
        f = vertex_frequencies(net.db, (i,))
        t = mptd(theme_subgraph(net.edges, f), f, alpha)
        if t:
            out[pattern_id((i,))] = t
            qualified.append(pattern_id((i,)))
    k = 2
    while qualified and k <= max_len:
        nxt = []
        for pid in apriori_candidates(qualified):
            p = pattern_items(pid)
            f = vertex_frequencies(net.db, p)
            t = mptd(theme_subgraph(net.edges, f), f, alpha)
            if t:
                out[pid] = t
                nxt.append(pid)
        qualified = nxt
        k += 1
    return out
