"""Table 4 — cohesiveness of ℓ-nucleus vs (k,γ)-truss vs (k,η)-core.

    spark-submit jobs/table4_cohesiveness.py [--sf 1.0]
"""
import sys

sys.path.insert(0, "jobs")
from _run import emit, parser, session  # noqa: E402

from repro.experiments import table4_cohesiveness  # noqa: E402

if __name__ == "__main__":
    args = parser(__doc__).parse_args()
    spark = session("table4")
    emit(
        table4_cohesiveness(spark, sf=args.sf),
        f"Table 4 nucleus/truss/core cohesiveness (sf={args.sf}, θ=0.1/0.3)",
    )
    spark.stop()
