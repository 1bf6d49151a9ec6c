"""Fig. 10: end-to-end runtime, Reptile vs Matlab-style dense EM.

Usage: python jobs/fig10_end_to_end.py [--quick]
"""
import argparse

import _common


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--quick", action="store_true")
    args = ap.parse_args()
    spark = _common.get_spark("fig10")

    from repro.experiments.fig10 import format_table, run

    kwargs = (
        dict(n_rows_absentee=20_000, n_rows_compas=10_000)
        if args.quick
        else dict(n_rows_absentee=179_000, n_rows_compas=60_843)
    )
    print("== Fig. 10: end-to-end runtime (20 EM iterations) ==")
    print(format_table(run(spark, **kwargs)))


if __name__ == "__main__":
    main()
