"""Reproduce paper Table III (workload summary: node counts, I/O ratio).

    spark-submit jobs/table3.py --sf 0.05
"""
from jobs._session import common_parser, emit, get_spark, prepare
from repro.experiments import table3_rows


def main() -> None:
    args = common_parser(__doc__).parse_args()
    spark = get_spark("sc-table3")
    try:
        _, profiles, _ = prepare(spark, args)
        rows = table3_rows(profiles)
        for r in rows:
            print(f"{r['workload']:<10} queries={r['tpcds_queries']:<14} "
                  f"nodes={r['n_nodes']} (paper {r['paper_n_nodes']}) "
                  f"io={r['io_ratio']:.1%} (paper {r['paper_io_ratio']:.1%})")
        emit(args, rows)
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
