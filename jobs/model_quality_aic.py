"""App. K (Fig. 16): ΔAIC of linear vs multi-level models, ± aux features.

Usage: python jobs/model_quality_aic.py
"""
import _common  # noqa: F401


def main() -> None:
    from repro.experiments.aic import format_table, run

    print("== App. K: model quality (ΔAIC, lower is better) ==")
    print(format_table(run()))


if __name__ == "__main__":
    main()
