"""Fig. 7 / Fig. 15: factorised vs dense matrix operation runtimes.

Usage: python jobs/fig7_matrix_ops.py [--quick] [--clusters] [--max-d D]
"""
import argparse

import _common  # noqa: F401  (env setup)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--quick", action="store_true", help="small sweep (tests)")
    ap.add_argument("--clusters", action="store_true", help="App. F per-cluster ops")
    ap.add_argument("--max-d", type=int, default=7)
    args = ap.parse_args()

    from repro.experiments.fig7 import format_table, sweep

    ds = (1, 2, 3) if args.quick else tuple(range(1, args.max_d + 1))
    cap = 20_000_000 if not args.quick else 100_000
    timings = sweep(ds=ds, dense_cap=cap, clusters=args.clusters)
    print("== Fig. 7: matrix operations (factorized vs dense/Lapack) ==")
    print(format_table(timings))


if __name__ == "__main__":
    main()
