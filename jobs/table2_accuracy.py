"""Table 2 — AP vs DP nucleus-score accuracy per dataset, θ ∈ {0.2, 0.4}.

    spark-submit jobs/table2_accuracy.py [--sf 1.0] [--names krogan dblp ...]
"""
import sys

sys.path.insert(0, "jobs")
from _run import emit, parser, session  # noqa: E402

from repro.experiments import table2_accuracy  # noqa: E402

if __name__ == "__main__":
    p = parser(__doc__)
    p.add_argument("--names", nargs="*", default=None)
    args = p.parse_args()
    spark = session("table2")
    emit(
        table2_accuracy(spark, names=args.names, sf=args.sf),
        f"Table 2 AP error vs DP (sf={args.sf}, θ=0.2/0.4)",
    )
    spark.stop()
