"""Fig. 8: multi-query execution vs LMFAO-style serial aggregates.

Usage: python jobs/fig8_multiquery.py [--quick]
"""
import argparse

import _common


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--quick", action="store_true")
    args = ap.parse_args()
    spark = _common.get_spark("fig8")

    from repro.experiments.fig8 import format_table, sweep

    # The serial arm materializes cross-hierarchy cartesian products, so its
    # cost grows quadratically in w — the sweep stops where that arm is
    # still tractable (the paper's C++ LMFAO comparison reached 10^6).
    ws = (100, 1000) if args.quick else (100, 1000, 3000)
    print("== Fig. 8: multi-query execution (shared vs serial) ==")
    print(format_table(sweep(spark, ws=ws)))


if __name__ == "__main__":
    main()
