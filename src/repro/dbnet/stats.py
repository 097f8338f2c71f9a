"""Database-network statistics — the quantities of the paper's Table 2."""
from __future__ import annotations

from typing import Dict

from pyspark.sql import functions as F

from repro.dbnet.generator import DatabaseNetwork


def network_stats(net: DatabaseNetwork) -> Dict[str, int]:
    """#Vertices, #Edges, #Transactions, #Items(total: stored item instances
    across all vertex databases), #Items(unique: |S|) — computed with Spark
    aggregations exactly as Table 2 defines them."""
    tx = net.transactions
    row = tx.select(
        F.count("*").alias("items_total"),
        F.countDistinct("item").alias("items_unique"),
    ).collect()[0]
    n_tx = tx.select("vid", "tid").distinct().count()
    return {
        "vertices": net.vertices.count(),
        "edges": net.edges.count(),
        "transactions": int(n_tx),
        "items_total": int(row.items_total),
        "items_unique": int(row.items_unique),
    }
