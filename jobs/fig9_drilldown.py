"""Fig. 9: drill-down optimization (Static vs Dynamic vs Cache+Dynamic).

Usage: python jobs/fig9_drilldown.py [--quick]
"""
import argparse

import _common


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--quick", action="store_true")
    args = ap.parse_args()
    spark = _common.get_spark("fig9")

    from repro.experiments.fig9 import format_table, sweep

    w = 500 if args.quick else 5000
    pre = (3,) if args.quick else (3, 4, 5)
    print("== Fig. 9: drill-down optimization ==")
    print(format_table(sweep(spark, n_pre_bs=pre, w=w)))


if __name__ == "__main__":
    main()
