"""Benchmark: Table 1 dataset-statistics pipeline (enumeration-heavy)."""
from repro.experiments import table1_stats


def test_table1_benchmark(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table1_stats(spark, sf=0.3), rounds=1, iterations=1
    )
    assert len(df) == 7
    # triangle-count ordering of the paper's Table 1 is preserved
    tri = dict(zip(df.graph, df.triangles))
    assert tri["krogan"] < tri["pokec"] < tri["enwiki"]
