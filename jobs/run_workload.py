"""Run a single MV refresh workload under a chosen method.

    spark-submit jobs/run_workload.py --workload io1_profit_report \
        --method sc --sf 0.05 --budget-pct 0.016

Methods: sc (MKP+MA-DFS plan), noopt (plain topological, no caching),
greedy/random/ratio (ablated flagging + MA-DFS), lru (result cache).
"""
import os

from jobs._session import common_parser, emit, get_spark, prepare
from repro.core.alternating import optimize
from repro.experiments import nominal_bytes
from repro.warehouse.executor import no_opt_plan, run_workload
from repro.warehouse.lru import run_workload_lru
from repro.warehouse.storage import EMULATED_NFS
from repro.warehouse.metadata import build_depgraph
from repro.workloads.tpcds import all_workloads


def main() -> None:
    p = common_parser(__doc__)
    p.add_argument("--workload", required=True,
                   choices=sorted(all_workloads()))
    p.add_argument("--method", default="sc",
                   choices=["sc", "noopt", "greedy", "random", "ratio", "lru"])
    p.add_argument("--budget-pct", type=float, default=0.016)
    p.add_argument("--partitioned", action="store_true",
                   help="use the TPC-DSp variant")
    args = p.parse_args()
    spark = get_spark(f"sc-run-{args.workload}")
    try:
        base, profiles, workdir = prepare(
            spark, args, partitioned=args.partitioned
        )
        wl, prof = profiles[args.workload]
        sizes = {n: prof.stats[n].out_bytes for n in wl.node_names}
        budget = args.budget_pct * nominal_bytes(args.sf)
        out_dir = os.path.join(workdir, f"run_{args.method}")
        if args.method == "lru":
            rep = run_workload_lru(spark, wl, sizes, budget, out_dir, base,
                                   storage=EMULATED_NFS)
        else:
            if args.method == "noopt":
                plan, budget = no_opt_plan(wl), 0.0
            else:
                g = build_depgraph(wl, prof)
                sel = "mkp" if args.method == "sc" else args.method
                plan = optimize(g, budget, node_selector=sel).plan
            rep = run_workload(spark, wl, plan, sizes, budget, out_dir, base,
                               storage=EMULATED_NFS)
        emit(args, {
            "workload": wl.name,
            "method": args.method,
            "total_s": rep.total_s,
            "flagged": sorted(rep.flagged),
            "peak_catalog_bytes": rep.peak_catalog_bytes,
            "order": list(rep.plan_order),
            "out_dir": out_dir,
        })
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
