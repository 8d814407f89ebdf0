"""Optimizer scalability on synthetic DAGs (paper §VI-H; no Spark
needed — pure Python, runs the S/C Opt ablation matrix).

    python jobs/optimizer_scalability.py --sizes 25 50 75 100
"""
import argparse
import json

from repro.experiments import OPT_METHODS, optimizer_scaling


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--sizes", type=int, nargs="+", default=[25, 50, 75, 100])
    p.add_argument("--seeds", type=int, default=8)
    p.add_argument("--out", default=None)
    args = p.parse_args()
    results = optimizer_scaling(args.sizes, args.seeds)
    print(f"{'method':<16}" + "".join(f"{n:>10}" for n in args.sizes))
    for m in OPT_METHODS:
        print(f"{m:<16}" + "".join(
            f"{results[m][n]:>10.4f}" for n in args.sizes))
    if args.out:
        with open(args.out, "w") as f:
            json.dump(results, f, indent=2)


if __name__ == "__main__":
    main()
