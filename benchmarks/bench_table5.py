"""Benchmark: Table 5 FG/WG Monte-Carlo sample-size stability (krogan)."""
from repro.experiments import table5_sample_size


def test_table5_benchmark(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table5_sample_size(
            spark, sf=0.5, sizes=((150, 0.1, 0.1), (500, 0.05, 0.06))
        ),
        rounds=1,
        iterations=1,
    )
    data = df[df.n.apply(lambda x: isinstance(x, int))]
    sd = df[df.n == "sd"].iloc[0]
    # paper Table 5: estimates barely move as n grows (SD ≲ 1–2% of mean)
    for col in ("g_PD", "w_PD", "g_PCC", "w_PCC"):
        mean = data[col].mean()
        if mean > 0:
            assert sd[col] <= 0.05 * mean + 0.01
