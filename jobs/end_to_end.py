"""End-to-end MV refresh comparison (paper §VI-B / Fig. 9 numbers):
no-opt vs S/C on all five workloads, plus Greedy/Ratio/LRU baselines on
the I/O 1 workload.

    spark-submit jobs/end_to_end.py --sf 0.05 --budget-pct 0.016
"""
import os

from jobs._session import common_parser, emit, get_spark, prepare
from repro.experiments import end_to_end_rows, nominal_bytes


def main() -> None:
    p = common_parser(__doc__)
    p.add_argument("--budget-pct", type=float, default=0.016,
                   help="Memory Catalog size as a fraction of dataset bytes")
    args = p.parse_args()
    spark = get_spark("sc-end-to-end")
    try:
        base, profiles, workdir = prepare(spark, args)
        rows = end_to_end_rows(
            spark, profiles, base, os.path.join(workdir, "runs"),
            budget=args.budget_pct * nominal_bytes(args.sf),
        )
        for r in rows:
            print(f"{r['workload']:<10} no_opt={r['no_opt_s']}s "
                  f"sc={r['sc_s']}s speedup={r['speedup']}x")
        emit(args, rows)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
