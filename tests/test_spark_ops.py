"""Catalyst graph ops vs the DuckDB oracle (repro/graphs/spark_ops.py).

Every relational result is checked with repro.oracle.assert_equivalent
so a broken join or wrong dedup is caught, not just "it ran".
"""
import pandas as pd
import pytest

from repro.graphs.datasets import edge_table
from repro.graphs.generators import edges_pdf, er_graph, planted_community_graph
from repro.graphs.global_graph import GlobalGraph
from repro.graphs import spark_ops
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def small_edges():
    return edges_pdf(er_graph(60, 0.15, seed=3))


@pytest.fixture(scope="module")
def comm_edges():
    return edges_pdf(planted_community_graph(150, [(10, 0.9), (8, 0.9)], seed=4))


class TestDegrees:
    def test_degrees_vs_oracle(self, spark, small_edges):
        e = spark_ops.to_spark_edges(spark, small_edges)
        got = spark_ops.degrees(e)
        assert_equivalent(
            got,
            """
            WITH sym AS (
              SELECT src AS v FROM edges UNION ALL SELECT dst AS v FROM edges
            )
            SELECT v, count(*) AS degree FROM sym GROUP BY v
            """,
            edges=small_edges,
        )

    def test_degree_stats_match_global_graph(self, spark, comm_edges):
        e = spark_ops.to_spark_edges(spark, comm_edges)
        stats = spark_ops.degree_stats(e)
        gg = GlobalGraph.from_edges(comm_edges)
        degs = [len(a) for a in gg.adj if a]
        assert stats["num_vertices"] == len(degs)
        assert stats["num_edges"] == gg.num_edges()
        assert stats["max_degree"] == max(degs)
        assert abs(stats["avg_degree"] - sum(degs) / len(degs)) < 1e-9


class TestTriangles:
    def test_triangle_count_vs_oracle(self, spark, small_edges):
        e = spark_ops.to_spark_edges(spark, small_edges)
        got = spark_ops.triangle_count(e)
        import duckdb

        con = duckdb.connect()
        con.register("edges", small_edges)
        expect = con.execute(
            """
            SELECT count(*) FROM edges e1
            JOIN edges e2 ON e2.src = e1.dst
            JOIN edges e3 ON e3.src = e1.src AND e3.dst = e2.dst
            """
        ).fetchone()[0]
        con.close()
        assert got == expect

    def test_known_triangle(self, spark):
        pdf = pd.DataFrame({"src": [0, 0, 1, 2], "dst": [1, 2, 2, 3]})
        e = spark_ops.to_spark_edges(spark, pdf)
        assert spark_ops.triangle_count(e) == 1


class TestKCore:
    @pytest.mark.parametrize("k", [2, 3, 4])
    def test_matches_global_graph_peeling(self, spark, comm_edges, k):
        e = spark_ops.to_spark_edges(spark, comm_edges)
        got = {r["v"] for r in spark_ops.kcore_vertices_spark(e, k).collect()}
        gg = GlobalGraph.from_edges(comm_edges)
        assert got == gg.kcore_vertices(k)


class TestTwoHop:
    def test_two_hop_counts_vs_oracle(self, spark, small_edges):
        e = spark_ops.to_spark_edges(spark, small_edges)
        got = spark_ops.two_hop_counts(e)
        assert_equivalent(
            got,
            """
            WITH sym AS (
              SELECT src AS u, dst AS v FROM edges
              UNION ALL SELECT dst AS u, src AS v FROM edges
            ),
            reach AS (
              SELECT u AS v, v AS w FROM sym
              UNION
              SELECT s1.u AS v, s2.v AS w FROM sym s1 JOIN sym s2 ON s1.v = s2.u
              UNION
              SELECT u AS v, u AS w FROM sym
            )
            SELECT v, count(*) AS n2plus FROM reach GROUP BY v
            """,
            edges=small_edges,
        )

    def test_two_hop_matches_global_graph(self, spark, comm_edges):
        e = spark_ops.to_spark_edges(spark, comm_edges)
        got = {r["v"]: r["n2plus"] for r in spark_ops.two_hop_counts(e).collect()}
        gg = GlobalGraph.from_edges(comm_edges)
        for v in range(gg.n):
            if gg.adj[v]:
                assert got[v] == len(gg.two_hop(v))


class TestDatasetEdgeTables:
    @pytest.mark.parametrize("name", ["CX_GSE1730", "kmer", "USA Road"])
    def test_edge_tables_canonical(self, name):
        pdf = edge_table(name)
        assert (pdf["src"] < pdf["dst"]).all()
        assert not pdf.duplicated(["src", "dst"]).any()
