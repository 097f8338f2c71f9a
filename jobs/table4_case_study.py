"""Table 4 / Figure 6 — the case study.

The paper mines the AMINER network and reports six theme communities whose
keyword sets are Table 4 (p1..p6), with structural findings: (a) the p2
community is a shrunken subset of the p1 community (Theorem 5.1); (b) hub
authors participate in several overlapping communities with different
themes; (c) two communities (p5, p6) overlap heavily in vertices while
differing in themes.

We plant those six keyword themes in a synthetic co-author network
(:func:`repro.dbnet.generator.case_study_network`), build a TC-Tree, query
it by each theme pattern, and report the recovered keyword set, community
size and the structural checks.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.reference import connected_components, pattern_id
from repro.core.tctree import TCTree
from repro.dbnet.generator import CASE_STUDY_THEMES, case_study_network


def _largest_community(edge_list):
    comps = connected_components(set(edge_list))
    return max(comps, key=len) if comps else set()


def run(spark: SparkSession, alpha: float = 0.2) -> pd.DataFrame:
    net, theme_items, item_names, author_names = case_study_network(spark)
    net.edges.persist()
    net.transactions.persist()
    tree, _report = TCTree.build(net, max_len=4)
    rows = []
    communities = {}
    for pk, theme in CASE_STUDY_THEMES.items():
        items = theme_items[pk]
        ans = tree.query(items, alpha)
        pid = pattern_id(items)
        edges = ans.get(pid, [])
        comm = _largest_community(edges)
        communities[pk] = comm
        members = sorted(author_names[v] for v in comm)
        rows.append(
            {
                "theme": pk,
                "keywords": ", ".join(sorted(theme)),
                "found": pid in ans,
                "community_size": len(comm),
                "hub_members": ", ".join(m for m in members if m.startswith(("hub", "bridge"))),
            }
        )
    df = pd.DataFrame(rows)
    # Structural findings from the paper's case study:
    p1, p2 = communities["p1"], communities["p2"]
    p5, p6 = communities["p5"], communities["p6"]
    df.attrs["p2_subset_of_p1"] = bool(p2) and p2 <= p1 and p2 < p1
    df.attrs["p5_p6_vertex_overlap"] = len(p5 & p6)
    df.attrs["p5_p6_theme_differs"] = set(theme_items["p5"]) != set(theme_items["p6"])
    net.edges.unpersist()
    net.transactions.unpersist()
    return df


def main() -> None:
    from jobs.common import get_session, show

    spark = get_session("table4_case_study")
    df = run(spark)
    show(df)
    print("p2 community strictly inside p1 community (Thm 5.1 shrinkage):", df.attrs["p2_subset_of_p1"])
    print("p5/p6 shared vertices (overlapping communities, distinct themes):", df.attrs["p5_p6_vertex_overlap"])
    spark.stop()


if __name__ == "__main__":
    main()
