"""Benchmark: Table 4 nucleus vs truss vs core cohesiveness comparison."""
from repro.experiments import table4_cohesiveness


def test_table4_benchmark(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table4_cohesiveness(spark, sf=0.2), rounds=1, iterations=1
    )
    assert len(df) == 6  # 3 datasets × 2 θ
    # paper Table 4 headline shapes: nucleus denser than core on PD and PCC,
    # and max scores ordered k_Nmax ≤ k_Tmax ≤ k_Cmax (the (r,s) ladder).
    assert (df.PD_N >= df.PD_C).all()
    assert (df.PCC_N >= df.PCC_C).all()
    assert (df.k_Nmax <= df.k_Tmax).all()
    assert (df.k_Tmax <= df.k_Cmax).all()
