"""Figure 3 — effect of the cohesion threshold α and TCS's frequency
threshold ε (Section 7.1).

The paper runs TCS(ε ∈ {0.1, 0.2, 0.3}), TCFA and TCFI on BFS-sampled
sub-networks (10k edges for BK/GW, 5k for AMINER) sweeping α, and reports
Time Cost / NP / NV / NE. Claims reproduced here:

* TCS cost is flat in α (dominated by candidate enumeration) and its NP is
  lossy at small α;
* TCFA cost falls steeply as α grows (fewer qualified patterns → fewer
  Apriori candidates);
* TCFI is fastest and stable across α, and TCFA ≡ TCFI exactly.
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

DEFAULT_ALPHAS = (0.0, 0.2, 0.5, 1.0)
DEFAULT_EPSILONS = (0.1, 0.2, 0.3)


def sampled_network(spark: SparkSession, dataset: str = "BK", n_edges: int = 400, sf: float = 0.01):
    net, _ = gen.paper_like_network(spark, dataset, sf=sf)
    sub = bfs_sample(net, n_edges, seed=1)
    sub.edges.persist()
    sub.transactions.persist()
    return sub


def run(
    spark: SparkSession,
    dataset: str = "BK",
    n_edges: int = 400,
    alphas: Sequence[float] = DEFAULT_ALPHAS,
    epsilons: Sequence[float] = DEFAULT_EPSILONS,
    max_len: int = 4,
) -> pd.DataFrame:
    net = sampled_network(spark, dataset, n_edges)
    rows = []
    for alpha in alphas:
        runs = [run_tcfa(net, alpha, max_len=max_len), run_tcfi(net, alpha, max_len=max_len)]
        runs += [run_tcs(net, alpha, eps, max_len=max_len) for eps in epsilons]
        for res in runs:
            m = res.metrics()
            rows.append(
                {
                    "dataset": dataset,
                    "method": res.method,
                    "alpha": alpha,
                    "seconds": round(res.wall_seconds, 2),
                    "mptd_calls": res.mptd_calls,
                    "NP": m["NP"],
                    "NV": m["NV"],
                    "NE": m["NE"],
                }
            )
            res.unpersist()
    return pd.DataFrame(rows)


def main() -> None:
    from jobs.common import get_session, show

    spark = get_session("fig3_params")
    show(run(spark))
    spark.stop()


if __name__ == "__main__":
    main()
