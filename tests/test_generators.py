"""Synthetic graph generators (repro/graphs/generators.py)."""
import numpy as np
import pytest

from repro.graphs.generators import (
    ba_graph,
    edges_pdf,
    er_graph,
    grid_graph,
    path_clique_graph,
    planted_community_graph,
)
from repro.graphs.global_graph import GlobalGraph


class TestDeterminism:
    @pytest.mark.parametrize("gen,kw", [
        (ba_graph, dict(n=200, m=2, seed=5)),
        (er_graph, dict(n=60, p=0.2, seed=5)),
        (grid_graph, dict(rows=8, cols=9, keep=0.7, seed=5)),
        (planted_community_graph, dict(n=150, communities=[(10, 0.9)], seed=5)),
    ])
    def test_same_seed_same_graph(self, gen, kw):
        assert gen(**kw) == gen(**kw)

    def test_different_seed_differs(self):
        assert er_graph(60, 0.2, seed=1) != er_graph(60, 0.2, seed=2)


class TestShapes:
    def test_ba_graph_connected_and_heavy_tailed(self):
        edges = ba_graph(500, 2, seed=0)
        gg = GlobalGraph.from_edges(edges_pdf(edges))
        degs = sorted((len(a) for a in gg.adj if a), reverse=True)
        assert degs[0] >= 4 * np.median(degs)  # heavy tail

    def test_er_edge_count_near_expectation(self):
        n, p = 80, 0.3
        m = len(er_graph(n, p, seed=0))
        expect = p * n * (n - 1) / 2
        assert 0.8 * expect < m < 1.2 * expect

    def test_grid_degrees_bounded(self):
        gg = GlobalGraph.from_edges(edges_pdf(grid_graph(10, 10)))
        assert max(len(a) for a in gg.adj) <= 4
        assert gg.num_edges() == 2 * 10 * 9

    def test_path_clique_components(self):
        edges = path_clique_graph(2, 10, 3, 4, seed=0)
        gg = GlobalGraph.from_edges(edges_pdf(edges))
        # paths contribute degree <= 2; cliques have degree 3
        assert max(len(a) for a in gg.adj) == 3
        assert gg.num_edges() == 2 * 9 + 3 * 6

    def test_planted_community_is_dense(self):
        edges = planted_community_graph(100, [(12, 1.0)], ba_m=1, seed=0)
        gg = GlobalGraph.from_edges(edges_pdf(edges))
        # some block of 12 consecutive vertices is a full clique
        found = any(
            all(
                (b in gg.adj[a])
                for a in range(s, s + 12)
                for b in range(a + 1, s + 12)
            )
            for s in range(0, 88)
        )
        assert found


class TestEdgesPdf:
    def test_canonical(self):
        pdf = edges_pdf({(3, 1), (0, 2)})
        assert pdf["src"].tolist() == [0, 1] and pdf["dst"].tolist() == [2, 3]

    def test_empty(self):
        pdf = edges_pdf(set())
        assert len(pdf) == 0 and list(pdf.columns) == ["src", "dst"]
