"""Reproduce paper Table V (S/C speedup on 1–5 worker clusters).

    spark-submit jobs/table5.py --sf 0.05
"""
from jobs._session import common_parser, emit, get_spark, prepare
from repro.experiments import nominal_bytes, table5_rows


def main() -> None:
    args = common_parser(__doc__).parse_args()
    spark = get_spark("sc-table5")
    try:
        _, profiles, _ = prepare(spark, args)
        rows = table5_rows(profiles, nominal_bytes(args.sf))
        for r in rows:
            print(f"workers={r['workers']} no_opt={r['no_opt_s']}s "
                  f"sc={r['sc_s']}s speedup={r['speedup']}x")
        emit(args, rows)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
