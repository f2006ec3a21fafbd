"""Table 3 — AP accuracy on pokec under Normal/Pareto/Uniform edge probs.

    spark-submit jobs/table3_distributions.py [--sf 1.0]
"""
import sys

sys.path.insert(0, "jobs")
from _run import emit, parser, session  # noqa: E402

from repro.experiments import table3_distributions  # noqa: E402

if __name__ == "__main__":
    args = parser(__doc__).parse_args()
    spark = session("table3")
    emit(
        table3_distributions(spark, sf=args.sf),
        f"Table 3 pokec distributions (sf={args.sf}, θ=0.1/0.2/0.3)",
    )
    spark.stop()
