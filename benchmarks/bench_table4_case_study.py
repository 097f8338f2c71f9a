"""Benchmark: Table 4 — the case-study pipeline end to end (plant the six
keyword themes, build the index, query every theme back)."""
from __future__ import annotations

from jobs.table4_case_study import run


def test_table4_case_study(benchmark, spark):
    df = benchmark.pedantic(lambda: run(spark), rounds=1, iterations=1)
    assert bool(df["found"].all())
    assert df.attrs["p2_subset_of_p1"]
    benchmark.extra_info["communities"] = df["community_size"].tolist()
