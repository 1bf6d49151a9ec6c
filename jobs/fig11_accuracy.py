"""Fig. 11: explanation accuracy vs Raw / Sensitivity / Support.

Usage: python jobs/fig11_accuracy.py [--quick] [--trials N]
"""
import argparse

import _common  # noqa: F401


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--quick", action="store_true")
    ap.add_argument("--trials", type=int, default=None)
    args = ap.parse_args()

    from repro.experiments.fig11 import format_table, sweep_single_errors

    n = args.trials or (10 if args.quick else 60)
    rhos = (0.6, 1.0) if args.quick else (0.6, 0.7, 0.8, 0.9, 1.0)
    pts = sweep_single_errors(rhos=rhos, n_trials=n)
    print(f"== Fig. 11: accuracy vs baselines ({n} trials/point) ==")
    print(format_table(pts, ("reptile", "raw", "sensitivity", "support")))


if __name__ == "__main__":
    main()
