"""Shared experiment harness behind Tables 1–3 (jobs/ and benchmarks/).

Each paper dataset maps to a :class:`DatasetSpec` bundling its table
pairs and per-dataset discovery knobs (the §6.4 sampling and support
threshold for Open data). ``run_table1/2/3`` produce one result row per
dataset, mirroring the paper's table columns; jobs print them and
EXPERIMENTS.md records paper-vs-measured values.

Scale notes: the paper's Auto-Join cap is 650,000 s on an EPYC server;
ours is configurable (default 20 s per table) with identical "score 0
at the cap" semantics. Dataset sizes default to the paper's (31
benchmark pairs of ~92 rows; Synth-50/500; Open data sampled) with a
``scale`` parameter to shrink everything for smoke runs.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Dict, List, Optional, Sequence, Tuple

from repro.autojoin import AutoJoinConfig, autojoin
from repro.core import DiscoveryConfig, discover
from repro.core.discover import DiscoveryResult
from repro.datasets import (
    TablePair,
    generate_open_data,
    synth_suite,
    web_benchmark,
)
from repro.rowmatch import match_rows_local, score_matching


@dataclass
class DatasetSpec:
    """One row of the paper's tables: a named set of table pairs."""

    name: str
    tables: List[TablePair]
    # §6.4 knobs (Open data): discovery-pair sampling + support threshold
    sample_size: Optional[int] = None
    min_support_frac: float = 0.0


def standard_datasets(
    *,
    scale: float = 1.0,
    n_synth_tables: int = 10,
    n_synth_tables_500: int = 2,
    open_rows: int = 3808,
    open_sample: int = 500,
    seed: int = 0,
) -> List[DatasetSpec]:
    """The six datasets of Tables 1–3, paper-sized at scale=1.

    ``n_synth_tables_500`` trims the 10-table mean for the two largest
    synthetic settings (quadratic coverage cost, §5.1) — recorded in
    EXPERIMENTS.md. ``open_sample`` is our analogue of the paper's
    3,000-pair sample on Open data, sized to this machine.
    """
    s = lambda n: max(5, int(n * scale))
    return [
        DatasetSpec(
            "Benchmark",
            web_benchmark(n_rows=s(92), seed=seed),
        ),
        DatasetSpec(
            "Open data",
            [generate_open_data(s(open_rows), seed=seed)],
            sample_size=open_sample,
            min_support_frac=0.01,
        ),
        DatasetSpec("Synth-50", synth_suite(s(50), n_tables=n_synth_tables, seed=seed)),
        DatasetSpec(
            "Synth-50L",
            synth_suite(s(50), long_rows=True, n_tables=n_synth_tables, seed=seed),
        ),
        DatasetSpec(
            "Synth-500", synth_suite(s(500), n_tables=n_synth_tables_500, seed=seed)
        ),
        DatasetSpec(
            "Synth-500L",
            synth_suite(s(500), long_rows=True, n_tables=n_synth_tables_500, seed=seed),
        ),
    ]


def _mean(xs: Sequence[float]) -> float:
    return sum(xs) / len(xs) if xs else 0.0


# ---------------------------------------------------------------------------
# Table 1 — row matching performance
# ---------------------------------------------------------------------------

@dataclass
class Table1Row:
    dataset: str
    n_rows: float
    avg_len: float
    n_pairs: float
    precision: float
    recall: float
    f1: float


def run_table1(specs: Sequence[DatasetSpec]) -> List[Table1Row]:
    rows = []
    for spec in specs:
        stats = []
        for tp in spec.tables:
            pairs = match_rows_local(tp.source, tp.target)
            m = score_matching(pairs, tp.golden)
            stats.append((len(tp.source), tp.avg_source_len(), m))
        rows.append(
            Table1Row(
                dataset=spec.name,
                n_rows=_mean([s[0] for s in stats]),
                avg_len=_mean([s[1] for s in stats]),
                n_pairs=_mean([s[2].n_pairs for s in stats]),
                precision=_mean([s[2].precision for s in stats]),
                recall=_mean([s[2].recall for s in stats]),
                f1=_mean([s[2].f1 for s in stats]),
            )
        )
    return rows


# ---------------------------------------------------------------------------
# Table 2 — coverage and runtime, ours vs Auto-Join, both matchings
# ---------------------------------------------------------------------------

@dataclass
class Table2Row:
    matching: str  # "ngram" | "golden"
    dataset: str
    top_cov: float
    coverage: float
    n_trans: float
    time_sec: float
    aj_top_cov: float
    aj_coverage: float
    aj_n_trans: float
    aj_time_sec: float
    aj_timeouts: int  # tables where Auto-Join hit the cap


def _matched_pairs(tp: TablePair, matching: str) -> List[Tuple[str, str]]:
    if matching == "golden":
        return tp.golden_text_pairs()
    matched = match_rows_local(tp.source, tp.target)
    return [(tp.source[i], tp.target[j]) for i, j in matched]


def run_tables23(
    specs: Sequence[DatasetSpec],
    *,
    matchings: Sequence[str] = ("ngram", "golden"),
    run_autojoin: bool = True,
    autojoin_cap_sec: float = 20.0,
    autojoin_subsets: int = 6,
    autojoin_subset_size: int = 2,
    seed: int = 0,
) -> Tuple[List[Table2Row], List["Table3Row"]]:
    """One discovery pass feeding both Table 2 and Table 3.

    The two tables report the same runs (coverage/time vs pruning
    stats), so computing them together halves the experiment cost.
    """
    rows2: List[Table2Row] = []
    rows3: List[Table3Row] = []
    aj_cfg = AutoJoinConfig(time_limit_sec=autojoin_cap_sec)
    for matching in matchings:
        for spec in specs:
            ours, ajs, prune, timeouts = [], [], [], 0
            for tp in spec.tables:
                pairs = _matched_pairs(tp, matching)
                golden = tp.golden_text_pairs()
                t0 = time.perf_counter()
                res = discover(
                    pairs,
                    sample_size=spec.sample_size,
                    min_support_frac=spec.min_support_frac,
                    seed=seed,
                )
                ours.append(
                    (
                        res.top_coverage_over(golden),
                        res.coverage_over(golden),
                        len(res.cover_set),
                        time.perf_counter() - t0,
                    )
                )
                prune.append(
                    (
                        res.gen_stats.n_generated,
                        res.gen_stats.n_unique,
                        res.gen_stats.duplicate_fraction,
                        res.cov_stats.cache_hit_ratio,
                    )
                )
                if run_autojoin:
                    aj_input = pairs
                    if spec.sample_size and len(aj_input) > spec.sample_size:
                        import random as _r

                        aj_input = _r.Random(seed).sample(aj_input, spec.sample_size)
                    aj = autojoin(
                        aj_input,
                        subset_size=autojoin_subset_size,
                        n_subsets=autojoin_subsets,
                        config=aj_cfg,
                        total_time_limit_sec=autojoin_cap_sec,
                        seed=seed,
                    )
                    if aj.timed_out:
                        timeouts += 1
                        # paper semantics: coverage 0 at the cap time
                        ajs.append((0.0, 0.0, len(aj.transformations), autojoin_cap_sec))
                    else:
                        ajs.append(
                            (
                                aj.top_coverage_over(golden),
                                aj.coverage_over(golden),
                                len(aj.transformations),
                                aj.elapsed_sec,
                            )
                        )
            rows2.append(
                Table2Row(
                    matching=matching,
                    dataset=spec.name,
                    top_cov=_mean([o[0] for o in ours]),
                    coverage=_mean([o[1] for o in ours]),
                    n_trans=_mean([o[2] for o in ours]),
                    time_sec=_mean([o[3] for o in ours]),
                    aj_top_cov=_mean([a[0] for a in ajs]),
                    aj_coverage=_mean([a[1] for a in ajs]),
                    aj_n_trans=_mean([a[2] for a in ajs]),
                    aj_time_sec=_mean([a[3] for a in ajs]),
                    aj_timeouts=timeouts,
                )
            )
            rows3.append(
                Table3Row(
                    matching=matching,
                    dataset=spec.name,
                    generated=_mean([s[0] for s in prune]),
                    to_try=_mean([s[1] for s in prune]),
                    duplicate_frac=_mean([s[2] for s in prune]),
                    cache_hit_ratio=_mean([s[3] for s in prune]),
                )
            )
    return rows2, rows3


def run_table2(specs: Sequence[DatasetSpec], **kwargs) -> List[Table2Row]:
    return run_tables23(specs, **kwargs)[0]


# ---------------------------------------------------------------------------
# Table 3 — pruning performance
# ---------------------------------------------------------------------------

@dataclass
class Table3Row:
    matching: str
    dataset: str
    generated: float
    to_try: float
    duplicate_frac: float
    cache_hit_ratio: float


def run_table3(
    specs: Sequence[DatasetSpec],
    *,
    matchings: Sequence[str] = ("ngram", "golden"),
    seed: int = 0,
) -> List[Table3Row]:
    return run_tables23(
        specs, matchings=matchings, run_autojoin=False, seed=seed
    )[1]
