"""Table 3 — TC-Tree indexing performance.

Builds a TC-Tree for each evaluation network and reports Indexing Time,
memory (peak driver RSS plus the index payload itself) and #Nodes (= number
of maximal pattern trusses indexed), mirroring the paper's Table 3. The
paper's absolute numbers (32 GB PC, C++/OpenMP, full-size datasets) are
recorded side by side in EXPERIMENTS.md; the reproduction claim is the
scaling shape, not the absolute cost.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.tctree import TCTree
from repro.dbnet import generator as gen

# Paper Table 3 for reference output.
PAPER_TABLE3 = {
    "BK": dict(seconds=179, memory_gb=0.3, nodes=18_581),
    "GW": dict(seconds=1_594, memory_gb=2.6, nodes=11_750_761),
    "AMINER": dict(seconds=41_068, memory_gb=28.3, nodes=152_067_019),
    "SYN": dict(seconds=35_836, memory_gb=26.6, nodes=132_985_944),
}

# Build scales chosen so the full suite indexes in minutes on one machine,
# with the same cost/node ordering as the paper (AMINER/SYN >> GW >> BK).
DEFAULT_SCALES = {"BK": 0.003, "GW": 0.003, "AMINER": 0.0015, "SYN": 300}


def build_network(spark: SparkSession, name: str, scales=None):
    scales = scales or DEFAULT_SCALES
    if name == "SYN":
        return gen.syn_network(
            spark,
            n_vertices=int(scales["SYN"]),
            m_attach=4,
            n_items=150,
            deg_cap=15,
            seed=11,
        )
    net, _ = gen.paper_like_network(spark, name, sf=scales[name])
    return net


def index_one(spark: SparkSession, name: str, scales=None) -> dict:
    net = build_network(spark, name, scales)
    net.edges.persist()
    net.transactions.persist()
    tree, report = TCTree.build(net)
    net.edges.unpersist()
    net.transactions.unpersist()
    paper = PAPER_TABLE3[name]
    return {
        "dataset": name,
        "indexing_seconds": round(report.wall_seconds, 2),
        "paper_seconds": paper["seconds"],
        "peak_rss_mb": round(report.peak_rss_mb, 1),
        "payload_mb": round(report.payload_bytes / 2**20, 3),
        "paper_memory_gb": paper["memory_gb"],
        "nodes": report.n_nodes,
        "paper_nodes": paper["nodes"],
        "max_depth": tree.max_depth(),
        "alpha_star": round(tree.alpha_star(), 3),
    }


def run(spark: SparkSession, scales=None, datasets=("BK", "GW", "AMINER", "SYN")) -> pd.DataFrame:
    return pd.DataFrame([index_one(spark, n, scales) for n in datasets])


def main() -> None:
    from jobs.common import get_session, show

    spark = get_session("table3_indexing")
    show(run(spark))
    spark.stop()


if __name__ == "__main__":
    main()
