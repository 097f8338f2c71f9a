"""Test-suite defaults and shared fixtures, layered over the provided root
conftest.

The root conftest reads SPARK_SHUFFLE_PARTITIONS when the session fixture is
first used (after this file is imported), so setting a default here takes
effect unless the caller overrides it. The suite's inputs are deliberately
tiny (SF<=0.01-equivalent networks); 64 shuffle partitions would spend more
time on empty-task scheduling than on data.
"""
import os

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")

import pytest  # noqa: E402

from repro.dbnet import generator as gen  # noqa: E402


@pytest.fixture(scope="session")
def small_net(spark):
    """One small planted database network shared across Spark test modules:
    3 planted 6-cliques with 2-item themes over 12 items, 40 vertices."""
    net, _truths = gen.planted_network(
        spark,
        n_vertices=40,
        n_items=12,
        n_communities=3,
        community_size=6,
        theme_len=2,
        theme_freq=0.7,
        p_intra=1.0,
        tx_per_vertex=10,
        noise_tx_len=1.0,
        seed=123,
    )
    net.edges.persist()
    net.transactions.persist()
    return net


@pytest.fixture(scope="session")
def small_py(small_net):
    """Driver-side twin of ``small_net`` for the reference oracle."""
    return small_net.to_python()
