"""Breadth-first network sampling (Section 7.1).

The paper produces smaller database networks for its parameter and
scalability studies "by performing a breadth first search from a randomly
picked seed vertex" until a target number of edges is collected. This
module reproduces that: BFS over the adjacency, accumulating every edge
incident to dequeued vertices in discovery order, then restricting the
vertex set, edge set and transaction databases to the sample.

The BFS itself runs on the driver over a collected edge list — sampling is
an experiment-harness step on laptop-scale graphs, not part of the measured
algorithms.
"""
from __future__ import annotations

from collections import deque
from typing import Dict, List, Set

import numpy as np
import pandas as pd
from pyspark.sql import functions as F

from repro.core.reference import Edge, canon
from repro.dbnet.generator import DatabaseNetwork


def bfs_sample(net: DatabaseNetwork, n_edges: int, seed: int = 0) -> DatabaseNetwork:
    """Sub-network induced by the first ``n_edges`` edges discovered by a BFS
    from a random seed vertex (restarting on a new component if exhausted)."""
    spark = net.edges.sparkSession
    all_edges: List[Edge] = [
        canon(int(r.u), int(r.v)) for r in net.edges.collect()
    ]
    adj: Dict[int, List[int]] = {}
    for u, v in all_edges:
        adj.setdefault(u, []).append(v)
        adj.setdefault(v, []).append(u)
    rng = np.random.default_rng(seed)
    vertices = sorted(adj)
    taken: Set[Edge] = set()
    visited: Set[int] = set()
    order = rng.permutation(len(vertices))
    oi = 0
    while len(taken) < min(n_edges, len(all_edges)) and oi < len(order):
        start = vertices[order[oi]]
        oi += 1
        if start in visited:
            continue
        q = deque([start])
        visited.add(start)
        while q and len(taken) < n_edges:
            x = q.popleft()
            for y in sorted(adj[x]):
                e = canon(x, y)
                if e not in taken:
                    taken.add(e)
                    if len(taken) >= n_edges:
                        break
                if y not in visited:
                    visited.add(y)
                    q.append(y)
    vids = sorted({x for e in taken for x in e})
    epdf = pd.DataFrame(sorted(taken), columns=["u", "v"])
    edf = spark.createDataFrame(epdf.astype(np.int64), schema="u long, v long")
    vdf = spark.createDataFrame(pd.DataFrame({"vid": np.array(vids, dtype=np.int64)}))
    tdf = net.transactions.join(vdf, "vid", "leftsemi")
    return DatabaseNetwork(
        vertices=vdf,
        edges=edf,
        transactions=tdf,
        n_items=net.n_items,
        name=f"{net.name}[bfs:{n_edges}]",
    )
