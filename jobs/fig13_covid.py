"""Fig. 13 + Tables 1–2: COVID-19 case study (30 replayed issues).

Usage: python jobs/fig13_covid.py [--quick]
"""
import argparse

import _common


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--quick", action="store_true", help="US issues only")
    args = ap.parse_args()
    spark = _common.get_spark("fig13")

    from repro.experiments.covid import (
        format_issue_table,
        run_case_study,
        summarize,
    )
    from repro.synth.covid import GLOBAL_ISSUES, US_ISSUES

    issues = US_ISSUES if args.quick else None
    results = run_case_study(spark, issues=issues)
    us = [r for r in results if r.issue.dataset == "us"]
    glob = [r for r in results if r.issue.dataset == "global"]
    print("== Table 1: US issues ==")
    print(format_issue_table(us))
    if glob:
        print("== Table 2: global issues ==")
        print(format_issue_table(glob))
    s = summarize(results)
    print("== Fig. 13 summary ==")
    print(
        f"accuracy: reptile={s['reptile']:.1%} (paper {s['paper_reptile']:.1%}), "
        f"sensitivity={s['sensitivity']:.1%} (paper 6.6%), "
        f"support={s['support']:.1%} (paper 3.3%)"
    )
    print(
        f"runtime per complaint: reptile={s['reptile_seconds']:.2f}s, "
        f"baselines={s['baseline_seconds']*1000:.2f}ms"
    )


if __name__ == "__main__":
    main()
