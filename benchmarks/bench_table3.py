"""Benchmark: Table 3 pokec probability-distribution sweep."""
from repro.experiments import table3_distributions


def test_table3_benchmark(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table3_distributions(spark, sf=0.2), rounds=1, iterations=1
    )
    assert list(df.dataset) == ["pokec_Normal", "pokec_Pareto", "pokec_Uniform"]
    # paper Table 3 shapes: robustness across distributions — errors shrink
    # as θ grows, Pareto (small probs → Le Cam regime) is the most accurate
    # and fastest, and even the worst case stays below 0.15.
    assert (df["avg_err@0.3"] <= df["avg_err@0.1"] + 1e-9).all()
    pareto = df[df.dataset == "pokec_Pareto"].iloc[0]
    err_cols = [c for c in df.columns if c.startswith("avg_err")]
    assert all(pareto[c] <= df[c].max() + 1e-9 for c in err_cols)
    assert pareto.avg_time_dp_s <= df.avg_time_dp_s.max() + 1e-9
    assert (df[err_cols].to_numpy() <= 0.2).all()
