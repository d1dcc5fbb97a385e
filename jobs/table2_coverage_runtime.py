#!/usr/bin/env python
"""Reproduce Table 2 — coverage & runtime, our approach vs Auto-Join.

Usage:
    python jobs/table2_coverage_runtime.py [--scale S] [--quick]
        [--aj-cap SECONDS] [--no-autojoin]

``--aj-cap`` is our analogue of the paper's 650,000 s Auto-Join time
cap (default 20 s per table; capped runs score coverage 0 at the cap,
exactly the paper's accounting).
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "src"))

from repro.experiments import run_table2, standard_datasets  # noqa: E402

PAPER = {
    # (matching, dataset): (top_cov, coverage, n_trans, time_s,
    #                       aj_top, aj_cov, aj_n, aj_time_s)
    ("ngram", "Benchmark"): (0.58, 1.00, 25.71, 22, 0.39, 0.43, 2.65, 269174),
    ("ngram", "Open data"): (0.30, 0.56, 3.00, 23386, 0.00, 0.00, 0.00, 91177),
    ("ngram", "Synth-50"): (0.42, 1.00, 3.00, 5, 0.42, 0.42, 1.00, 84463),
    ("ngram", "Synth-50L"): (0.40, 1.00, 3.00, 21, None, None, None, 650000),
    ("ngram", "Synth-500"): (0.39, 1.00, 18.00, 232, 0.39, 0.71, 3.00, 239559),
    ("ngram", "Synth-500L"): (0.35, 0.68, 49.00, 1026, None, None, None, 650000),
    ("golden", "Benchmark"): (0.58, 1.00, 13.94, 7, 0.37, 0.44, 3.13, 200281),
    ("golden", "Open data"): (0.30, 0.66, 8.00, 4147, 0.15, 0.15, 1.00, 124626),
    ("golden", "Synth-50"): (0.42, 1.00, 3.00, 6, 0.42, 0.42, 1.00, 302647),
    ("golden", "Synth-50L"): (0.40, 1.00, 3.00, 27, None, None, None, 650000),
    ("golden", "Synth-500"): (0.39, 1.00, 3.00, 432, None, None, None, 650000),
    ("golden", "Synth-500L"): (0.35, 1.00, 3.00, 2119, None, None, None, 650000),
}


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--quick", action="store_true")
    ap.add_argument("--aj-cap", type=float, default=20.0)
    ap.add_argument("--no-autojoin", action="store_true")
    args = ap.parse_args()
    if args.quick:
        specs = standard_datasets(
            scale=0.2, n_synth_tables=2, n_synth_tables_500=1, open_rows=400,
            open_sample=200,
        )
    else:
        specs = standard_datasets(scale=args.scale)

    print("Table 2 — Coverage and runtime, ours (Auto-Join in parens)")
    print(
        f"{'Match':<7} {'Dataset':<11} {'TopCov':>14} {'Coverage':>14} "
        f"{'#Trans':>14} {'Time(s)':>18}"
    )
    for row in run_table2(
        specs, run_autojoin=not args.no_autojoin, autojoin_cap_sec=args.aj_cap
    ):
        aj_time = f"{row.aj_time_sec:.0f}"
        if row.aj_timeouts:
            aj_time = f">{row.aj_time_sec:.0f}*{row.aj_timeouts}"
        print(
            f"{row.matching:<7} {row.dataset:<11} "
            f"{row.top_cov:>6.2f} ({row.aj_top_cov:.2f}) "
            f"{row.coverage:>6.2f} ({row.aj_coverage:.2f}) "
            f"{row.n_trans:>6.1f} ({row.aj_n_trans:.1f}) "
            f"{row.time_sec:>8.1f} ({aj_time})"
        )
        p = PAPER.get((row.matching, row.dataset))
        if p:
            aj = (
                f"({p[4]:.2f}) .. ({p[5]:.2f}) .. ({p[6]})"
                if p[4] is not None
                else "(timeout)"
            )
            print(
                f"{'':<7} {'paper:':<11} {p[0]:>6.2f} / cov {p[1]:.2f} / "
                f"n {p[2]} / t {p[3]}s   AJ: {aj} t {p[7]}s"
            )


if __name__ == "__main__":
    main()
