#!/usr/bin/env python
"""Run Tables 1–3 at paper scale in one pass and dump results as JSON.

This is the script behind the numbers recorded in EXPERIMENTS.md; the
per-table jobs (table1_row_matching.py, …) regenerate individual tables.
Tables 2 and 3 share one discovery pass (same runs, different columns).

Usage: python jobs/run_all_tables.py [--out results.json] [--aj-cap 10]
"""
import argparse
import dataclasses
import json
import sys
import time
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "src"))

from repro.experiments import (  # noqa: E402
    run_table1,
    run_tables23,
    standard_datasets,
)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--out", default="results_tables.json")
    ap.add_argument("--aj-cap", type=float, default=10.0)
    ap.add_argument("--synth-500-tables", type=int, default=2)
    args = ap.parse_args()

    t0 = time.time()
    specs = standard_datasets(n_synth_tables_500=args.synth_500_tables)
    print(f"[{time.time()-t0:7.1f}s] datasets generated", flush=True)

    t1 = run_table1(specs)
    print(f"[{time.time()-t0:7.1f}s] table 1 done", flush=True)
    for r in t1:
        print("  ", r, flush=True)

    t2, t3 = run_tables23(specs, autojoin_cap_sec=args.aj_cap)
    print(f"[{time.time()-t0:7.1f}s] tables 2+3 done", flush=True)
    for r in t2:
        print("  ", r, flush=True)
    for r in t3:
        print("  ", r, flush=True)

    out = {
        "table1": [dataclasses.asdict(r) for r in t1],
        "table2": [dataclasses.asdict(r) for r in t2],
        "table3": [dataclasses.asdict(r) for r in t3],
        "aj_cap_sec": args.aj_cap,
        "elapsed_sec": time.time() - t0,
    }
    Path(args.out).write_text(json.dumps(out, indent=2))
    print(f"[{time.time()-t0:7.1f}s] wrote {args.out}", flush=True)


if __name__ == "__main__":
    main()
