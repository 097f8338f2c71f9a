"""Evaluation metrics used throughout Section 7.

NP — number of detected maximal pattern trusses (= number of patterns);
NV — total vertex count over all trusses, a vertex counted once per truss
     containing it;
NE — total edge count over all trusses, likewise with multiplicity.
"""
from __future__ import annotations

from typing import Dict, Iterable, Mapping, Set, Tuple

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.reference import Edge


def truss_metrics(pattern_edges: DataFrame) -> Dict[str, int]:
    """NP/NV/NE of a (pid, u, v, ...) pattern-truss frame, in one pass."""
    row = pattern_edges.select(
        F.countDistinct("pid").alias("NP"), F.count("*").alias("NE")
    ).collect()[0]
    nv = (
        pattern_edges.select("pid", F.col("u").alias("vid"))
        .union(pattern_edges.select("pid", F.col("v").alias("vid")))
        .distinct()
        .count()
    )
    return {"NP": int(row.NP), "NV": int(nv), "NE": int(row.NE)}


def truss_metrics_py(trusses: Mapping[str, Set[Edge]]) -> Dict[str, int]:
    """Same metrics over a driver-side {pid: edge set} result."""
    np_ = len(trusses)
    ne = sum(len(es) for es in trusses.values())
    nv = sum(len({x for e in es for x in e}) for es in trusses.values())
    return {"NP": np_, "NV": nv, "NE": ne}
