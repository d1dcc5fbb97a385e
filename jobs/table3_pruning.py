#!/usr/bin/env python
"""Reproduce Table 3 — pruning performance (duplicates + cache hits).

Usage: ``python jobs/table3_pruning.py [--scale S] [--quick]``
"""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "src"))

from repro.experiments import run_table3, standard_datasets  # noqa: E402

PAPER = {
    # (matching, dataset): (generated, to_try, dup%, cache hit%)
    ("ngram", "Benchmark"): (190100.8, 49560.7, 52.1, 85.4),
    ("ngram", "Open data"): (3628823.0, 1848653.0, 49.1, 99.0),
    ("ngram", "Synth-50"): (76624.0, 35552.8, 52.4, 94.8),
    ("ngram", "Synth-50L"): (625475.5, 148256.5, 72.5, 96.7),
    ("ngram", "Synth-500"): (584663.4, 274491.2, 51.8, 95.2),
    ("ngram", "Synth-500L"): (6371427.7, 1479046.5, 74.1, 97.3),
    ("golden", "Benchmark"): (78922.7, 30636.9, 45.8, 74.2),
    ("golden", "Open data"): (794078.0, 435771.0, 45.1, 97.1),
    ("golden", "Synth-50"): (90553.7, 40832.4, 53.1, 94.2),
    ("golden", "Synth-50L"): (656267.0, 156242.1, 72.4, 96.3),
    ("golden", "Synth-500"): (745167.0, 344282.5, 52.2, 95.0),
    ("golden", "Synth-500L"): (6874889.8, 1602243.3, 73.7, 96.6),
}


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--quick", action="store_true")
    args = ap.parse_args()
    if args.quick:
        specs = standard_datasets(
            scale=0.2, n_synth_tables=2, n_synth_tables_500=1, open_rows=400,
            open_sample=200,
        )
    else:
        specs = standard_datasets(scale=args.scale)

    print("Table 3 — Pruning performance")
    print(
        f"{'Match':<7} {'Dataset':<11} {'Generated':>12} {'ToTry':>12} "
        f"{'Dup%':>7} {'CacheHit%':>10}"
    )
    for row in run_table3(specs):
        print(
            f"{row.matching:<7} {row.dataset:<11} {row.generated:>12.1f} "
            f"{row.to_try:>12.1f} {row.duplicate_frac * 100:>6.1f}% "
            f"{row.cache_hit_ratio * 100:>9.1f}%"
        )
        p = PAPER.get((row.matching, row.dataset))
        if p:
            print(
                f"{'':<7} {'paper:':<11} {p[0]:>12.1f} {p[1]:>12.1f} "
                f"{p[2]:>6.1f}% {p[3]:>9.1f}%"
            )


if __name__ == "__main__":
    main()
