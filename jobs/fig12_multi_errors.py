"""Fig. 12: complaint ablation (Reptile vs Outlier) with decoy errors.

Usage: python jobs/fig12_multi_errors.py [--quick] [--trials N]
"""
import argparse

import _common  # noqa: F401


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--quick", action="store_true")
    ap.add_argument("--trials", type=int, default=None)
    args = ap.parse_args()

    from repro.experiments.fig11 import format_table, sweep_multi_errors

    n = args.trials or (10 if args.quick else 60)
    rhos = (0.6, 1.0) if args.quick else (0.6, 0.7, 0.8, 0.9, 1.0)
    pts = sweep_multi_errors(rhos=rhos, n_trials=n)
    print(f"== Fig. 12: multi-error complaint ablation ({n} trials/point) ==")
    print(format_table(pts, ("reptile", "outlier")))


if __name__ == "__main__":
    main()
