"""Relational kernels & storage vs the DuckDB oracle.

Everything here is plain relational algebra (degrees, induced-subgraph
extraction, the §3.1 prefix-size index, triangle enumeration/support), so
``repro.oracle.assert_equivalent`` re-runs each query on DuckDB over the
same pandas inputs and diffs the sorted rows.
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graphs.storage import SparkGraph
from repro.kernels.degrees import degrees
from repro.kernels.triangles import edge_support, triangle_count, triangles
from repro.oracle import assert_equivalent

from .paper_graphs import fig3_graph
from .spark_helpers import random_ref_graph, ref_to_pandas, ref_to_spark


@pytest.fixture(scope="module")
def g3(spark):
    ref = fig3_graph()
    return ref, ref_to_spark(spark, ref), *ref_to_pandas(ref)


@pytest.fixture(scope="module")
def grand(spark):
    ref = random_ref_graph(120, 420, seed=5)
    return ref, ref_to_spark(spark, ref), *ref_to_pandas(ref)


class TestDegrees:
    def test_degrees_vs_duckdb(self, g3):
        _, sg, vpdf, epdf = g3
        assert_equivalent(
            degrees(sg.edges),
            """
            SELECT id, COUNT(*) AS degree FROM (
              SELECT src AS id FROM edges UNION ALL SELECT dst AS id FROM edges
            ) GROUP BY id
            """,
            edges=epdf,
        )

    def test_degrees_with_isolated_vertices(self, spark):
        vp = pd.DataFrame({"id": [0, 1, 2, 3], "weight": [4.0, 3.0, 2.0, 1.0]})
        ep = pd.DataFrame({"src": [0], "dst": [1]})
        sg = SparkGraph.from_pandas(spark, vp, ep)
        assert_equivalent(
            degrees(sg.edges, sg.vertices),
            """
            SELECT v.id, COUNT(e.id) AS degree
            FROM vertices v LEFT JOIN (
              SELECT src AS id FROM edges UNION ALL SELECT dst AS id FROM edges
            ) e USING (id) GROUP BY v.id
            """,
            vertices=vp,
            edges=ep,
        )


class TestSubgraphExtraction:
    @pytest.mark.parametrize("tau", [5.0, 12.0, 18.0, 22.0])
    def test_edges_of_g_ge_tau(self, g3, tau):
        ref, sg, vpdf, epdf = g3
        sub = sg.subgraph_ge(tau)
        assert_equivalent(
            sub.edges.select("src", "dst"),
            f"""
            SELECT e.src, e.dst FROM edges e
            JOIN vertices a ON a.id = e.src
            JOIN vertices b ON b.id = e.dst
            WHERE a.weight >= {tau} AND b.weight >= {tau}
            """,
            edges=epdf,
            vertices=vpdf,
        )

    @pytest.mark.parametrize("tau", [5.0, 12.0, 18.0])
    def test_matches_ref_subgraph(self, g3, tau):
        ref, sg, _, _ = g3
        sub_ref = ref.subgraph_ge(tau)
        sub = sg.subgraph_ge(tau)
        assert sub.counts() == (sub_ref.n, sub_ref.n_edges)


class TestPrefixIndex:
    def test_vs_duckdb_window_query(self, grand):
        _, sg, vpdf, epdf = grand
        ew = epdf.merge(vpdf.rename(columns={"id": "src", "weight": "w_src"}), on="src")
        ew = ew.merge(vpdf.rename(columns={"id": "dst", "weight": "w_dst"}), on="dst")
        assert_equivalent(
            sg.prefix_index(),
            """
            WITH updeg AS (
              SELECT CASE WHEN w_src < w_dst THEN src ELSE dst END AS id,
                     COUNT(*) AS up_degree
              FROM edges_w GROUP BY 1
            )
            SELECT v.id, v.weight,
                   ROW_NUMBER() OVER (ORDER BY v.weight DESC) AS rank,
                   COALESCE(u.up_degree, 0) AS up_degree,
                   ROW_NUMBER() OVER (ORDER BY v.weight DESC)
                   + SUM(COALESCE(u.up_degree, 0)) OVER
                     (ORDER BY v.weight DESC ROWS UNBOUNDED PRECEDING) AS cum_size
            FROM vertices v LEFT JOIN updeg u USING (id)
            """,
            vertices=vpdf,
            edges_w=ew,
        )

    def test_matches_ref_prefix_sizes(self, grand):
        ref, sg, _, _ = grand
        idx = sg.prefix_index().orderBy("rank").toPandas()
        assert list(idx["cum_size"]) == [ref.prefix_size(r) for r in range(1, ref.n + 1)]

    def test_tau_for_size_matches_ref(self, grand):
        ref, sg, _, _ = grand
        for target in [1, 10, 50, ref.size // 2, ref.size, ref.size * 3]:
            r = ref.r_for_size(target)
            assert sg.tau_for_size(target) == ref.weight[ref.order[r - 1]]

    def test_tau_for_rank(self, g3):
        ref, sg, _, _ = g3
        assert sg.tau_for_rank(7) == 18.0  # Example 3.1's τ₁

    def test_size_at_tau(self, g3):
        ref, sg, _, _ = g3
        assert sg.size_at_tau(18.0) == 18  # Example 3.1: 7 vertices + 11 edges
        assert sg.size_at_tau(12.0) == 36


class TestTriangles:
    def test_triangles_vs_duckdb(self, grand):
        _, sg, _, epdf = grand
        ce = pd.DataFrame(
            {"a": epdf[["src", "dst"]].min(axis=1), "b": epdf[["src", "dst"]].max(axis=1)}
        )
        assert_equivalent(
            triangles(sg.edges),
            """
            SELECT e1.a AS a, e1.b AS b, e2.b AS c
            FROM ce e1
            JOIN ce e2 ON e2.a = e1.b
            JOIN ce e3 ON e3.a = e1.a AND e3.b = e2.b
            """,
            ce=ce,
        )

    def test_support_vs_duckdb(self, g3):
        _, sg, _, epdf = g3
        ce = pd.DataFrame(
            {"a": epdf[["src", "dst"]].min(axis=1), "b": epdf[["src", "dst"]].max(axis=1)}
        )
        assert_equivalent(
            edge_support(sg.edges),
            """
            WITH t AS (
              SELECT e1.a AS a, e1.b AS b, e2.b AS c
              FROM ce e1
              JOIN ce e2 ON e2.a = e1.b
              JOIN ce e3 ON e3.a = e1.a AND e3.b = e2.b
            ), sides AS (
              SELECT a, b FROM t
              UNION ALL SELECT a, c AS b FROM t
              UNION ALL SELECT b AS a, c AS b FROM t
            )
            SELECT ce.a, ce.b, COALESCE(s.support, 0) AS support
            FROM ce LEFT JOIN (
              SELECT a, b, COUNT(*) AS support FROM sides GROUP BY a, b
            ) s USING (a, b)
            """,
            ce=ce,
        )

    def test_triangle_count_cliques(self, spark):
        # K4 has exactly 4 triangles.
        vp = pd.DataFrame({"id": range(4), "weight": [1.0, 2.0, 3.0, 4.0]})
        ep = pd.DataFrame(
            [(a, b) for a in range(4) for b in range(a + 1, 4)], columns=["src", "dst"]
        )
        sg = SparkGraph.from_pandas(spark, vp, ep)
        assert triangle_count(sg.edges) == 4


class TestHalfEdges:
    def test_half_edge_count(self, g3):
        ref, sg, _, _ = g3
        assert sg.half_edges().count() == 2 * ref.n_edges
