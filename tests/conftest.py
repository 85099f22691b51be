"""Shared fixtures: datasets (local + Spark) built once per session."""
import pandas as pd
import pytest

from repro.graphs import AttributedGraph
from repro.graphs.datasets import load
from repro.graphs.generator import planted_homogeneous


@pytest.fixture(scope="session")
def tiny():
    """An 80-node planted graph — the workhorse for algorithm tests."""
    return planted_homogeneous(n_comms=4, comm_size=20, p_in=0.45, m_out=40, seed=7)


@pytest.fixture(scope="session")
def tiny_spark(spark, tiny):
    g = AttributedGraph.from_local(spark, tiny.graph).cache()
    g.num_nodes()  # materialise
    return g


@pytest.fixture(scope="session")
def tiny_edges_pdf(tiny):
    rows = [(v, u) for v in tiny.graph.adj for u in tiny.graph.adj[v] if v < u]
    return pd.DataFrame(rows, columns=["src", "dst"])


@pytest.fixture(scope="session")
def fb():
    return load("facebook")


@pytest.fixture(scope="session")
def fb_spark(spark, fb):
    g = AttributedGraph.from_local(spark, fb.graph).cache()
    g.num_nodes()
    return g


@pytest.fixture(scope="session")
def dblp():
    return load("dblp")


@pytest.fixture(scope="session")
def dblp_spark(spark, dblp):
    g = AttributedGraph.from_local(spark, dblp.graph).cache()
    g.num_nodes()
    return g
