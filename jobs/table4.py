"""Reproduce paper Table IV (read/compute/query latency vs Memory
Catalog size, TPC-DS and TPC-DSp).

    spark-submit jobs/table4.py --sf 0.05
"""
from jobs._session import common_parser, emit, get_spark, prepare
from repro.experiments import TABLE4_PCTS, nominal_bytes, table4_sweep


def main() -> None:
    args = common_parser(__doc__).parse_args()
    spark = get_spark("sc-table4")
    out = {}
    try:
        for label, part in (("TPC-DS", False), ("TPC-DSp", True)):
            _, profiles, _ = prepare(spark, args, partitioned=part)
            res = table4_sweep(profiles, nominal_bytes(args.sf))
            out[label] = res
            cols = ["no_opt"] + TABLE4_PCTS
            print(f"\n{label}")
            for metric in ("read", "compute", "query"):
                print(f"  {metric:<8}" + "".join(
                    f"{res[metric][c]:>10.1f}" for c in cols))
        emit(args, out)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
