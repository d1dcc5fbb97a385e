#!/usr/bin/env python
"""Render measured Tables 2/3 from results_tables.json into EXPERIMENTS.md.

Replaces the ``<!-- MEASURED_TABLE2 -->`` / ``<!-- MEASURED_TABLE3 -->``
markers with markdown tables pairing the paper's numbers with measured
ones. Idempotent: re-running regenerates the blocks.
"""
import json
import re
import sys
from pathlib import Path

ROOT = Path(__file__).resolve().parents[1]

PAPER_T2 = {
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

PAPER_T3 = {
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


def t2_block(results: dict) -> str:
    cap = results["aj_cap_sec"]
    lines = [
        "| Match | Dataset | TopCov p/ours | Coverage p/ours | #Trans p/ours | "
        "Time(s) p/ours | AJ TopCov p/ours | AJ Cov p/ours | AJ Time p/ours |",
        "|---|---|---|---|---|---|---|---|---|",
    ]
    for r in results["table2"]:
        p = PAPER_T2[(r["matching"], r["dataset"])]
        aj_top = "t/o" if p[4] is None else f"{p[4]:.2f}"
        aj_cov = "t/o" if p[5] is None else f"{p[5]:.2f}"
        aj_time_ours = (
            f">{cap:.0f}×{r['aj_timeouts']}" if r["aj_timeouts"] else f"{r['aj_time_sec']:.0f}"
        )
        lines.append(
            f"| {r['matching']} | {r['dataset']} "
            f"| {p[0]:.2f} / {r['top_cov']:.2f} "
            f"| {p[1]:.2f} / {r['coverage']:.2f} "
            f"| {p[2]:.4g} / {r['n_trans']:.1f} "
            f"| {p[3]:.4g} / {r['time_sec']:.1f} "
            f"| {aj_top} / {r['aj_top_cov']:.2f} "
            f"| {aj_cov} / {r['aj_coverage']:.2f} "
            f"| {p[7]:.3g} / {aj_time_ours} |"
        )
    return "\n".join(lines)


def t3_block(results: dict) -> str:
    lines = [
        "| Match | Dataset | Generated p/ours | ToTry p/ours | Dup% p/ours | CacheHit% p/ours |",
        "|---|---|---|---|---|---|",
    ]
    for r in results["table3"]:
        p = PAPER_T3[(r["matching"], r["dataset"])]
        lines.append(
            f"| {r['matching']} | {r['dataset']} "
            f"| {p[0]:,.0f} / {r['generated']:,.0f} "
            f"| {p[1]:,.0f} / {r['to_try']:,.0f} "
            f"| {p[2]:.1f} / {r['duplicate_frac'] * 100:.1f} "
            f"| {p[3]:.1f} / {r['cache_hit_ratio'] * 100:.1f} |"
        )
    return "\n".join(lines)


def main() -> None:
    results = json.loads((ROOT / "results_tables.json").read_text())
    md = (ROOT / "EXPERIMENTS.md").read_text()
    md = re.sub(
        r"<!-- MEASURED_TABLE2 -->(?:\n(?!\n## ).*)*",
        "<!-- MEASURED_TABLE2 -->\n" + t2_block(results),
        md,
    )
    md = re.sub(
        r"<!-- MEASURED_TABLE3 -->(?:\n(?!\n## ).*)*",
        "<!-- MEASURED_TABLE3 -->\n" + t3_block(results),
        md,
    )
    (ROOT / "EXPERIMENTS.md").write_text(md)
    print("EXPERIMENTS.md updated")


if __name__ == "__main__":
    main()
