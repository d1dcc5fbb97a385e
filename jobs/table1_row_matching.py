#!/usr/bin/env python
"""Reproduce Table 1 — row matching performance (P/R/F1 per dataset).

Usage: ``python jobs/table1_row_matching.py [--scale S] [--quick]``

Row matching is pure string/index work; the Spark dataflow variant is
exercised by tests/benchmarks — this job uses the equivalent local path
so the table regenerates quickly and deterministically.
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "src"))

from repro.experiments import run_table1, standard_datasets  # noqa: E402

PAPER = {
    # dataset: (#rows, avg len, #pairs, P, R, F1) from the paper's Table 1
    "Benchmark": (92.13, 31.08, 112.55, 0.81, 0.93, 0.86),
    "Open data": (3808, 19.33, 360125, 0.01, 0.92, 0.02),
    "Synth-50": (50, 27.59, 44.20, 1.00, 0.88, 0.94),
    "Synth-50L": (50, 55.41, 48.00, 1.00, 0.96, 0.98),
    "Synth-500": (500, 27.64, 416.10, 0.97, 0.81, 0.87),
    "Synth-500L": (500, 55.26, 460.40, 0.96, 0.89, 0.92),
}


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--quick", action="store_true", help="tiny smoke run")
    args = ap.parse_args()
    if args.quick:
        specs = standard_datasets(
            scale=0.2, n_synth_tables=2, n_synth_tables_500=1, open_rows=400
        )
    else:
        specs = standard_datasets(scale=args.scale)

    hdr = f"{'Dataset':<11} {'#Rows':>7} {'AvgLen':>7} {'#Pairs':>9} {'P':>6} {'R':>6} {'F1':>6}"
    print("Table 1 — Row matching performance (measured | paper)")
    print(hdr)
    for row in run_table1(specs):
        p = PAPER.get(row.dataset)
        print(
            f"{row.dataset:<11} {row.n_rows:>7.1f} {row.avg_len:>7.2f} "
            f"{row.n_pairs:>9.1f} {row.precision:>6.2f} {row.recall:>6.2f} {row.f1:>6.2f}"
            + (
                f"   | paper: P={p[3]:.2f} R={p[4]:.2f} F1={p[5]:.2f}"
                if p
                else ""
            )
        )


if __name__ == "__main__":
    main()
