"""Benchmark: Table 2 AP-vs-DP accuracy sweep (all six analogs)."""
from repro.experiments import table2_accuracy


def test_table2_benchmark(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table2_accuracy(
            spark, names=["krogan", "dblp", "flickr", "pokec", "biomine", "ljournal"],
            sf=0.15,
        ),
        rounds=1,
        iterations=1,
    )
    assert len(df) == 6
    # paper Table 2 shapes: errors shrink as θ grows; the small-probability
    # datasets (dblp/flickr/biomine, Le Cam regime) are exactly right; when
    # AP errs it is off by exactly 1 (avg err == pct/100); errors stay
    # far from "wrong decomposition" magnitude at the larger θ.
    assert (df["avg_err@0.4"] <= df["avg_err@0.2"] + 1e-9).all()
    low_p = df[df.graph.isin(["dblp", "flickr", "biomine"])]
    assert (low_p["avg_err@0.2"] <= 0.01).all() and (low_p["avg_err@0.4"] <= 0.01).all()
    for theta in (0.2, 0.4):
        assert (abs(df[f"avg_err@{theta}"] * 100 - df[f"pct_err@{theta}"]) < 3.0).all()
    assert (df["avg_err@0.4"] <= 0.1).all()
