"""Tests for meta-path projection (Spark + local + generator oracle)."""
import pandas as pd
import pytest

from repro.graphs import AttributedGraph, LocalGraph, maximal_connected_kcore
from repro.graphs.generator import planted_heterogeneous, planted_homogeneous
from repro.hetero import (
    metapath_pairs,
    metapath_pairs_local,
    metapath_project,
    metapath_project_local,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def hetero():
    return planted_heterogeneous(
        n_comms=3, comm_size=12, p_in=0.5, m_out=12, seed=21,
        target_type="A", bridge_type="P", flavour_types=("V",),
    )


@pytest.fixture(scope="module")
def hetero_spark(spark, hetero):
    g = AttributedGraph.from_local(spark, hetero.graph).cache()
    g.num_nodes()
    return g


class TestLocalProjection:
    def test_recovers_planted_graph(self, hetero):
        base = planted_homogeneous(
            n_comms=3, comm_size=12, p_in=0.5, m_out=12, seed=21
        )
        pairs = metapath_pairs_local(hetero.graph, ("A", "P", "A"))
        want = {
            (v, u) for v in base.graph.adj for u in base.graph.adj[v] if v < u
        }
        assert pairs == want

    def test_projected_graph_keeps_targets(self, hetero):
        proj = metapath_project_local(hetero.graph, ("A", "P", "A"))
        targets = {v for v, t in hetero.graph.ntypes.items() if t == "A"}
        assert set(proj.adj) == targets

    def test_projected_attrs_preserved(self, hetero):
        proj = metapath_project_local(hetero.graph, ("A", "P", "A"))
        v = next(iter(hetero.communities))
        assert proj.tattrs[v] == hetero.graph.tattrs[v]

    def test_no_path_through_flavour(self, hetero):
        # A-V-A finds nothing: flavour hubs attach to bridges, not targets
        assert metapath_pairs_local(hetero.graph, ("A", "V", "A")) == set()

    def test_untyped_graph_raises(self):
        g = LocalGraph.from_edges([(0, 1)])
        with pytest.raises(ValueError):
            metapath_pairs_local(g, ("A", "P", "A"))

    def test_short_path_raises(self, hetero):
        with pytest.raises(ValueError):
            metapath_pairs_local(hetero.graph, ("A",))

    def test_kp_core_lives_in_projection(self, hetero):
        proj = metapath_project_local(hetero.graph, ("A", "P", "A"))
        q = next(iter(hetero.communities))
        core = maximal_connected_kcore(proj, q, 3)
        gt = hetero.community_of(q)
        if not core:
            pytest.skip("q not in 3-core of projection")
        assert len(core & gt) / len(core) > 0.6


class TestSparkProjection:
    def test_matches_local(self, hetero, hetero_spark):
        got = {
            (r.src, r.dst)
            for r in metapath_pairs(hetero_spark, ("A", "P", "A")).collect()
        }
        assert got == metapath_pairs_local(hetero.graph, ("A", "P", "A"))

    def test_duckdb_oracle(self, hetero, hetero_spark):
        """A-P-A pairs via a two-hop SQL join oracle."""
        nt = hetero.graph.ntypes
        edges = pd.DataFrame(
            [
                (v, u)
                for v in hetero.graph.adj
                for u in hetero.graph.adj[v]
            ],
            columns=["src", "dst"],
        )
        nodes = pd.DataFrame(
            [(v, t) for v, t in nt.items()], columns=["id", "ntype"]
        )
        got = metapath_pairs(hetero_spark, ("A", "P", "A"))
        assert_equivalent(
            got,
            """
            SELECT DISTINCT
                   LEAST(e1.src, e2.dst) AS src,
                   GREATEST(e1.src, e2.dst) AS dst
            FROM edges e1
            JOIN nodes a1 ON a1.id = e1.src AND a1.ntype = 'A'
            JOIN nodes p  ON p.id  = e1.dst AND p.ntype  = 'P'
            JOIN edges e2 ON e2.src = e1.dst
            JOIN nodes a2 ON a2.id = e2.dst AND a2.ntype = 'A'
            WHERE e1.src <> e2.dst
            """,
            edges=edges,
            nodes=nodes,
        )

    def test_project_nodes_are_targets(self, hetero, hetero_spark):
        proj = metapath_project(hetero_spark, ("A", "P", "A"))
        got = {r.id for r in proj.nodes.select("id").collect()}
        want = {v for v, t in hetero.graph.ntypes.items() if t == "A"}
        assert got == want


class TestSEAOnProjection:
    def test_sea_on_projected_dblp(self, dblp):
        from repro.core import SEAParams, sea_search
        from repro.graphs import core_decomposition

        proj = metapath_project_local(dblp.graph, dblp.meta_path)
        cor = core_decomposition(proj)
        q = next(v for v in sorted(dblp.communities) if cor.get(v, 0) >= 5)
        r = sea_search(proj, q, SEAParams(k=4, e=0.25, seed=1))
        assert r.community is not None
        assert maximal_connected_kcore(proj, q, 4, within=r.community) == r.community
        # the community stays within target-typed nodes
        assert all(dblp.graph.ntypes[v] == "A" for v in r.community)
