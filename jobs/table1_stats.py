"""Table 1 — dataset statistics of every analog (|V|, |E|, d_max, p_avg, |△|).

    spark-submit jobs/table1_stats.py [--sf 1.0]
"""
import sys

sys.path.insert(0, "jobs")
from _run import emit, parser, session  # noqa: E402

from repro.datasets import PAPER_TABLE1  # noqa: E402
from repro.experiments import table1_stats  # noqa: E402

if __name__ == "__main__":
    args = parser(__doc__).parse_args()
    spark = session("table1")
    df = table1_stats(spark, sf=args.sf)
    emit(df, f"Table 1 analog statistics (sf={args.sf})")
    import pandas as pd

    emit(
        pd.DataFrame([{"graph": k, **v} for k, v in PAPER_TABLE1.items()]),
        "Paper Table 1 (original datasets, for comparison)",
    )
    spark.stop()
