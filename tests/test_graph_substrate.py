"""Spark graph substrate vs the DuckDB oracle: canonical edges, degrees,
triangle and 4-clique enumeration, incidence."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from helpers import CLIQUE_SQL, TRIANGLE_SQL, complete_graph, random_prob_graph
from repro.datasets import analog_pdf
from repro.graph.cliques import four_cliques, incidence
from repro.graph.edges import canonical_edges, degrees, oriented, vertex_ranks
from repro.graph.triangles import triangles
from repro.oracle import assert_equivalent


def spark_edges(spark, pdf):
    return spark.createDataFrame(pdf)


# --- canonicalization -------------------------------------------------------


def test_canonical_flips_and_dedupes(spark):
    raw = pd.DataFrame(
        [(2, 1, 0.5), (1, 2, 0.8), (3, 3, 0.9), (4, 5, 0.1)],
        columns=["u", "v", "p"],
    )
    got = canonical_edges(spark_edges(spark, raw)).toPandas()
    got = got.sort_values(["u", "v"]).reset_index(drop=True)
    assert got.values.tolist() == [[1, 2, 0.8], [4, 5, 0.1]]


def test_degrees_vs_duckdb(spark):
    pdf = random_prob_graph(30, 0.3, seed=1)
    e = canonical_edges(spark_edges(spark, pdf))
    deg = degrees(e).withColumnRenamed("deg", "d")
    assert_equivalent(
        deg,
        "SELECT vid, count(*)::BIGINT AS d FROM "
        "(SELECT u AS vid FROM e UNION ALL SELECT v FROM e) GROUP BY vid",
        e=pdf,
    )


def test_ranks_are_permutation(spark):
    pdf = random_prob_graph(25, 0.3, seed=2)
    r = vertex_ranks(canonical_edges(spark_edges(spark, pdf))).toPandas()
    assert sorted(r["rank"]) == list(range(len(r)))


def test_oriented_preserves_edges_and_orients_by_rank(spark):
    pdf = random_prob_graph(25, 0.3, seed=3)
    e = canonical_edges(spark_edges(spark, pdf))
    d = oriented(e, vertex_ranks(e))
    assert d.count() == e.count()
    assert d.filter(F.col("rs") >= F.col("rd")).count() == 0


# --- triangles vs DuckDB ----------------------------------------------------


@pytest.mark.parametrize("seed,n,ps", [(1, 20, 0.4), (2, 30, 0.3), (3, 40, 0.2), (4, 15, 0.7)])
def test_triangles_match_duckdb(spark, seed, n, ps):
    pdf = random_prob_graph(n, ps, seed=seed)
    t = triangles(spark_edges(spark, pdf)).select(
        F.sort_array(F.array("x", "y", "z")).getItem(0).alias("a"),
        F.sort_array(F.array("x", "y", "z")).getItem(1).alias("b"),
        F.sort_array(F.array("x", "y", "z")).getItem(2).alias("c"),
        "p_tri",
    )
    assert_equivalent(t, TRIANGLE_SQL, e=pdf)


def test_triangles_k6_count(spark):
    assert triangles(spark_edges(spark, complete_graph(6, 0.5))).count() == 20


def test_triangles_on_analog_matches_duckdb(spark):
    pdf = analog_pdf("krogan", sf=0.05)
    t = triangles(spark_edges(spark, pdf)).select(
        F.sort_array(F.array("x", "y", "z")).getItem(0).alias("a"),
        F.sort_array(F.array("x", "y", "z")).getItem(1).alias("b"),
        F.sort_array(F.array("x", "y", "z")).getItem(2).alias("c"),
        "p_tri",
    )
    assert_equivalent(t, TRIANGLE_SQL, e=pdf)


def test_triangle_p_tri_is_product(spark):
    pdf = pd.DataFrame([(0, 1, 0.5), (0, 2, 0.4), (1, 2, 0.3)], columns=["u", "v", "p"])
    t = triangles(spark_edges(spark, pdf)).collect()
    assert len(t) == 1
    assert t[0].p_tri == pytest.approx(0.5 * 0.4 * 0.3)


# --- 4-cliques vs DuckDB ----------------------------------------------------


@pytest.mark.parametrize("seed,n,ps", [(5, 15, 0.6), (6, 20, 0.5), (7, 25, 0.4)])
def test_cliques_match_duckdb(spark, seed, n, ps):
    pdf = random_prob_graph(n, ps, seed=seed)
    c = four_cliques(spark_edges(spark, pdf)).select(
        F.sort_array(F.array("x", "y", "z", "w")).getItem(0).alias("a"),
        F.sort_array(F.array("x", "y", "z", "w")).getItem(1).alias("b"),
        F.sort_array(F.array("x", "y", "z", "w")).getItem(2).alias("c"),
        F.sort_array(F.array("x", "y", "z", "w")).getItem(3).alias("d"),
    )
    assert_equivalent(c, CLIQUE_SQL, e=pdf)


def test_cliques_k6_count(spark):
    assert four_cliques(spark_edges(spark, complete_graph(6, 0.5))).count() == 15


def test_clique_probs_cover_all_six_edges(spark):
    pdf = pd.DataFrame(
        [(0, 1, 0.11), (0, 2, 0.13), (0, 3, 0.17), (1, 2, 0.19), (1, 3, 0.23), (2, 3, 0.29)],
        columns=["u", "v", "p"],
    )
    rows = four_cliques(spark_edges(spark, pdf)).collect()
    assert len(rows) == 1
    r = rows[0]
    got = sorted([r.p_xy, r.p_xz, r.p_yz, r.p_xw, r.p_yw, r.p_zw])
    assert got == pytest.approx(sorted(pdf.p))


# --- incidence --------------------------------------------------------------


def test_incidence_four_rows_per_clique(spark):
    pdf = complete_graph(6, 0.5)
    c = four_cliques(spark_edges(spark, pdf))
    inc = incidence(c)
    assert inc.count() == 4 * c.count()
    per = inc.groupBy("cid").count().toPandas()
    assert set(per["count"]) == {4}


def test_incidence_ext_prob_k4(spark):
    """K4 with distinct probs: each triangle's ext prob is the product of
    the three edges touching the left-out vertex."""
    pdf = pd.DataFrame(
        [(0, 1, 0.11), (0, 2, 0.13), (0, 3, 0.17), (1, 2, 0.19), (1, 3, 0.23), (2, 3, 0.29)],
        columns=["u", "v", "p"],
    )
    p = {(u, v): pr for u, v, pr in pdf.itertuples(index=False)}
    inc = incidence(four_cliques(spark_edges(spark, pdf))).collect()
    expect = {}
    for tri, out in [((0, 1, 2), 3), ((0, 1, 3), 2), ((0, 2, 3), 1), ((1, 2, 3), 0)]:
        key = "-".join(map(str, tri))
        expect[key] = 1.0
        for x in tri:
            expect[key] *= p[tuple(sorted((x, out)))]
    got = {r.tid: r.ext_prob for r in inc}
    assert got == pytest.approx(expect)


def test_triangle_support_counts_match_duckdb(spark):
    """#cliques per triangle (the c_△ of the paper) vs a DuckDB aggregate."""
    pdf = random_prob_graph(18, 0.6, seed=9)
    inc = incidence(four_cliques(spark_edges(spark, pdf)))
    sup = inc.groupBy("tid").agg(F.count("*").alias("c"))
    sql = f"""
    WITH c4 AS ({CLIQUE_SQL})
    , inc AS (
      SELECT a||'-'||b||'-'||c AS tid FROM c4
      UNION ALL SELECT a||'-'||b||'-'||d FROM c4
      UNION ALL SELECT a||'-'||c||'-'||d FROM c4
      UNION ALL SELECT b||'-'||c||'-'||d FROM c4
    )
    SELECT tid, count(*)::BIGINT AS c FROM inc GROUP BY tid
    """
    assert_equivalent(sup, sql, e=pdf)
