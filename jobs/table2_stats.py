"""Table 2 — statistics of the database networks.

Generates the four evaluation networks (BK/GW/AMINER substitutes at a scale
factor, SYN via the paper's own procedure) and reports the exact columns of
the paper's Table 2: #Vertices, #Edges, #Transactions, #Items (total),
#Items (unique), next to the paper's values scaled by the same factor.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.dbnet import generator as gen
from repro.dbnet.stats import network_stats

DEFAULT_SF = 0.01
SYN_VERTICES = 2000


def build_network(spark: SparkSession, name: str, sf: float = DEFAULT_SF, syn_vertices: int = SYN_VERTICES):
    """The evaluation network for one Table-2 row."""
    if name == "SYN":
        # paper SYN: 10^6 vertices, 10^7 edges → E/V = 10 → m_attach = 10
        return gen.syn_network(spark, n_vertices=syn_vertices, m_attach=10, n_items=400, seed=11)
    net, _ = gen.paper_like_network(spark, name, sf=sf)
    return net


def run(spark: SparkSession, sf: float = DEFAULT_SF, syn_vertices: int = SYN_VERTICES) -> pd.DataFrame:
    rows = []
    for name in ("BK", "GW", "AMINER", "SYN"):
        net = build_network(spark, name, sf=sf, syn_vertices=syn_vertices)
        s = network_stats(net)
        paper = gen.PAPER_TABLE2[name]
        scale = syn_vertices / paper["v"] if name == "SYN" else sf
        rows.append(
            {
                "dataset": name,
                "vertices": s["vertices"],
                "paper_vertices_scaled": round(paper["v"] * scale),
                "edges": s["edges"],
                "paper_edges_scaled": round(paper["e"] * scale),
                "transactions": s["transactions"],
                "paper_tx_scaled": round(paper["tx"] * scale),
                "items_total": s["items_total"],
                "paper_items_total_scaled": round(paper["items_total"] * scale),
                "items_unique": s["items_unique"],
                "paper_items_unique": round(paper["items_unique"]),
            }
        )
    return pd.DataFrame(rows)


def main() -> None:
    from jobs.common import get_session, show

    spark = get_session("table2_stats")
    show(run(spark))
    spark.stop()


if __name__ == "__main__":
    main()
