"""§5.4 FIST user-study surrogate: 22 scripted complaints.

Usage: python jobs/fist_study.py [--quick]
"""
import argparse

import _common


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--quick", action="store_true", help="6-scenario subset")
    args = ap.parse_args()
    spark = _common.get_spark("fist")

    from repro.experiments.fist import format_table, run_study

    only = [1, 5, 10, 13, 21, 22] if args.quick else None
    print("== §5.4 FIST study (paper: 20/22 resolved) ==")
    print(format_table(run_study(spark, only=only)))


if __name__ == "__main__":
    main()
