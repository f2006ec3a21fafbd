"""§7.2 inline table — AP vs DP runtime on the enwiki analog, θ = 0.1..0.5.

--budget seconds reproduces the paper's "N.P." entries: DP runs that exceed
the budget are reported as N.P. rather than a time.

    spark-submit jobs/table6_enwiki_runtime.py [--sf 1.0] [--budget 900]
"""
import sys

sys.path.insert(0, "jobs")
from _run import emit, parser, session  # noqa: E402

from repro.experiments import table6_enwiki_runtime  # noqa: E402

if __name__ == "__main__":
    p = parser(__doc__)
    p.add_argument("--budget", type=float, default=None)
    args = p.parse_args()
    spark = session("table6")
    emit(
        table6_enwiki_runtime(spark, sf=args.sf, budget_s=args.budget),
        f"§7.2 enwiki AP vs DP runtime (sf={args.sf}, budget={args.budget})",
    )
    spark.stop()
