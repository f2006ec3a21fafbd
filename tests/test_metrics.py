"""PD / PCC metrics (Eq. 19–20): pandas vs Spark vs DuckDB oracle."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from helpers import complete_graph, random_prob_graph
from repro.nucleus.metrics import pcc_spark, pd_pcc_pandas, pd_spark, subgraph_stats
from repro.oracle import assert_equivalent


def test_pd_complete_graph_prob_one():
    pd_, pcc = pd_pcc_pandas(complete_graph(6, 1.0))
    assert pd_ == pytest.approx(1.0)
    assert pcc == pytest.approx(1.0)


def test_pd_scales_with_probability():
    pd_, pcc = pd_pcc_pandas(complete_graph(6, 0.4))
    assert pd_ == pytest.approx(0.4)
    assert pcc == pytest.approx(0.4 ** 3 / 0.4 ** 2)


def test_pcc_star_is_zero():
    star = pd.DataFrame([(0, i, 0.9) for i in range(1, 6)], columns=["u", "v", "p"])
    pd_, pcc = pd_pcc_pandas(star)
    assert pcc == 0.0


def test_empty_edges():
    assert pd_pcc_pandas(pd.DataFrame(columns=["u", "v", "p"])) == (0.0, 0.0)


@pytest.mark.parametrize("seed", [1, 2, 3])
def test_spark_equals_pandas(spark, seed):
    pdf = random_prob_graph(25, 0.4, seed=seed)
    sdf = spark.createDataFrame(pdf)
    pd_p, pcc_p = pd_pcc_pandas(pdf)
    assert pd_spark(sdf) == pytest.approx(pd_p)
    assert pcc_spark(sdf) == pytest.approx(pcc_p)


def test_pd_sum_vs_duckdb(spark):
    """The Σp(e) numerator via Spark agg vs DuckDB SQL (oracle check)."""
    pdf = random_prob_graph(30, 0.3, seed=5)
    sdf = spark.createDataFrame(pdf).agg(F.sum("p").alias("s"))
    assert_equivalent(sdf, "SELECT sum(p) AS s FROM e", e=pdf)


def test_pcc_numerator_vs_duckdb(spark):
    """3·Σ_△ p·p·p numerator via the distributed triangle enumeration vs
    DuckDB self-joins."""
    from helpers import TRIANGLE_SQL
    from repro.graph.triangles import triangles

    pdf = random_prob_graph(25, 0.45, seed=6)
    num = triangles(spark.createDataFrame(pdf)).agg(
        F.round(F.sum("p_tri"), 6).alias("s")
    )
    assert_equivalent(
        num, f"SELECT round(sum(p_tri), 6) AS s FROM ({TRIANGLE_SQL})", e=pdf
    )


def test_subgraph_stats_shape():
    s = subgraph_stats(complete_graph(5, 0.5))
    assert s["V"] == 5 and s["E"] == 10
    assert 0 < s["PD"] <= 1 and 0 < s["PCC"] <= 1
