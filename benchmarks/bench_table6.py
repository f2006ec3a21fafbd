"""Benchmark: §7.2 enwiki AP-vs-DP runtime table (the scalability claim)."""
from repro.experiments import table6_enwiki_runtime


def test_table6_benchmark(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table6_enwiki_runtime(spark, sf=0.2, thetas=(0.1, 0.3, 0.5)),
        rounds=1,
        iterations=1,
    )
    assert len(df) == 3
    # paper shape: AP beats DP, most at the smallest θ; both shrink as θ grows
    row01 = df[df.theta == 0.1].iloc[0]
    assert row01.ap_s <= row01.dp_s * 1.05
    assert df[df.theta == 0.5].iloc[0].dp_s <= row01.dp_s
    # AP's k_max stays within 1 of exact DP's at every θ (Table 2 regime)
    assert (abs(df.ap_kmax - df.dp_kmax) <= 1).all()
