"""Figure 4 — scalability of TCS/TCFA/TCFI in the number of sampled edges
(Section 7.2, worst case α = 0).

Claims reproduced: every method's cost grows with network size; TCFI grows
far slower (the paper reports >2 orders of magnitude on large networks,
driven by MPTD-call pruning and intersection-local MPTD inputs); detected
trusses stay small on average (NV/NP, NE/NP), which is *why* intersection
pruning works.
"""
from __future__ import annotations

from typing import Sequence

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.tcs import run_tcs
from repro.core.tcfa import run_tcfa
from repro.core.tcfi import run_tcfi
from repro.dbnet import generator as gen
from repro.dbnet.sampling import bfs_sample

DEFAULT_SIZES = (150, 300, 600)


def run(
    spark: SparkSession,
    dataset: str = "BK",
    sizes: Sequence[int] = DEFAULT_SIZES,
    sf: float = 0.01,
    eps: float = 0.2,
    max_len: int = 4,
) -> pd.DataFrame:
    base, _ = gen.paper_like_network(spark, dataset, sf=sf)
    rows = []
    for n_edges in sizes:
        net = bfs_sample(base, n_edges, seed=1)
        net.edges.persist()
        net.transactions.persist()
        for res in (
            run_tcs(net, 0.0, eps, max_len=max_len),
            run_tcfa(net, 0.0, max_len=max_len),
            run_tcfi(net, 0.0, max_len=max_len),
        ):
            m = res.metrics()
            np_ = max(1, m["NP"])
            rows.append(
                {
                    "dataset": dataset,
                    "edges": n_edges,
                    "method": res.method,
                    "seconds": round(res.wall_seconds, 2),
                    "mptd_calls": res.mptd_calls,
                    "NP": m["NP"],
                    "NV/NP": round(m["NV"] / np_, 2),
                    "NE/NP": round(m["NE"] / np_, 2),
                }
            )
            res.unpersist()
        net.edges.unpersist()
        net.transactions.unpersist()
    return pd.DataFrame(rows)


def main() -> None:
    from jobs.common import get_session, show

    spark = get_session("fig4_scalability")
    show(run(spark))
    spark.stop()


if __name__ == "__main__":
    main()
