"""Table 5 — effect of the Monte-Carlo sample count n (ε, δ) on FG/WG
average PD/PCC/|E|/|V|, krogan analog, θ = 0.1. Also emits the Figure 4
companion L/FG/WG timing rows with --timings.

    spark-submit jobs/table5_samples.py [--sf 1.0] [--timings]
"""
import sys

sys.path.insert(0, "jobs")
from _run import emit, parser, session  # noqa: E402

from repro.experiments import decomposition_timings, table5_sample_size  # noqa: E402

if __name__ == "__main__":
    p = parser(__doc__)
    p.add_argument("--timings", action="store_true")
    args = p.parse_args()
    spark = session("table5")
    emit(
        table5_sample_size(spark, sf=args.sf),
        f"Table 5 FG/WG vs sample size (krogan analog, sf={args.sf}, θ=0.1)",
    )
    if args.timings:
        emit(
            decomposition_timings(spark, sf=args.sf),
            "Figure 4 companion: L/FG/WG runtimes (θ=0.1)",
        )
    spark.stop()
