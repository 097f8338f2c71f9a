"""Figure 5 — TC-Tree query performance (Section 7.3).

Two query modes, as in the paper:

* QBA (query by alpha): q = S, sweep α_q from 0 upward until the answer is
  empty. Query time and retrieved nodes (RN) should both fall as α_q grows.
* QBP (query by pattern): α_q = 0, query patterns sampled from each tree
  layer. Query time and RN grow with pattern length.

The paper's headline: ~1 million maximal pattern trusses retrieved within
1 second. We report nodes/second for comparison.
"""
from __future__ import annotations

import time

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.reference import pattern_items
from repro.core.tctree import TCTree
from repro.dbnet import generator as gen


def build_tree(spark: SparkSession, dataset: str = "GW", sf: float = 0.002, repeats: int = 50):
    net, _ = gen.paper_like_network(spark, dataset, sf=sf)
    net.edges.persist()
    net.transactions.persist()
    tree, _ = TCTree.build(net)
    net.edges.unpersist()
    net.transactions.unpersist()
    return tree


def qba_sweep(tree: TCTree, step: float = 0.1, repeats: int = 20) -> pd.DataFrame:
    rows = []
    alpha = 0.0
    while True:
        t0 = time.perf_counter()
        for _ in range(repeats):
            ans = tree.query(None, alpha)
        dt = (time.perf_counter() - t0) / repeats
        if not ans:
            break
        rows.append(
            {
                "mode": "QBA",
                "alpha": round(alpha, 2),
                "retrieved_nodes": len(ans),
                "query_ms": round(dt * 1e3, 4),
                "nodes_per_sec": round(len(ans) / dt),
            }
        )
        alpha += step
    return pd.DataFrame(rows)


def qbp_sweep(tree: TCTree, n_queries: int = 50, repeats: int = 20) -> pd.DataFrame:
    rows = []
    for depth in range(1, tree.max_depth() + 1):
        pids = tree.sample_patterns_by_depth(depth, n_queries, seed=depth)
        if not pids:
            continue
        total_rn = 0
        t0 = time.perf_counter()
        for _ in range(repeats):
            total_rn = 0
            for pid in pids:
                total_rn += len(tree.query(pattern_items(pid), 0.0))
        dt = (time.perf_counter() - t0) / repeats / len(pids)
        rows.append(
            {
                "mode": "QBP",
                "pattern_len": depth,
                "n_queries": len(pids),
                "avg_retrieved_nodes": round(total_rn / len(pids), 2),
                "query_ms": round(dt * 1e3, 4),
                "nodes_per_sec": round((total_rn / len(pids)) / dt) if dt > 0 else 0,
            }
        )
    return pd.DataFrame(rows)


def run(spark: SparkSession, dataset: str = "GW", sf: float = 0.002) -> pd.DataFrame:
    tree = build_tree(spark, dataset, sf)
    qba = qba_sweep(tree)
    qbp = qbp_sweep(tree)
    out = pd.concat([qba, qbp], ignore_index=True)
    out.attrs["n_nodes"] = tree.n_nodes
    return out


def main() -> None:
    from jobs.common import get_session, show

    spark = get_session("fig5_query")
    df = run(spark)
    print(f"TC-Tree nodes: {df.attrs['n_nodes']}")
    show(df)
    spark.stop()


if __name__ == "__main__":
    main()
