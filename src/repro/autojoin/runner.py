"""Auto-Join end-to-end runner: subset sampling + result aggregation (§3.2, §6.2).

Auto-Join assumes a single transformation covers each sampled subset; a
noisy subset forces the search through the whole parameter space and
typically ends in failure or timeout — the behaviour behind the paper's
">650,000 s" entries. The runner draws ``n_subsets`` random subsets of
``subset_size`` pairs (the paper uses 6 subsets of size 2), runs the
backtracking search on each under a shared wall-clock cap, and returns
all distinct transformations found; per the paper, Auto-Join "does not
find a covering set and only returns all transformations that cover at
least one subset".
"""
from __future__ import annotations

import random
import time
from dataclasses import dataclass, field, replace
from typing import List, Optional, Sequence, Set, Tuple

from repro.core.units import Transformation

from .search import AutoJoinConfig, autojoin_single


@dataclass
class AutoJoinResult:
    """What Table 2 reports for the baseline."""

    transformations: List[Transformation]
    covers: List[Set[int]]
    n_pairs: int
    elapsed_sec: float
    timed_out: bool

    @property
    def top_coverage(self) -> float:
        if not self.covers or self.n_pairs == 0:
            return 0.0
        return max(len(c) for c in self.covers) / self.n_pairs

    @property
    def set_coverage(self) -> float:
        if self.n_pairs == 0:
            return 0.0
        covered: Set[int] = set()
        for c in self.covers:
            covered |= c
        return len(covered) / self.n_pairs

    def coverage_over(self, pairs: Sequence[Tuple[str, str]]) -> float:
        if not pairs:
            return 0.0
        n = sum(
            1
            for src, tgt in pairs
            if any(t.covers(src, tgt) for t in self.transformations)
        )
        return n / len(pairs)

    def top_coverage_over(self, pairs: Sequence[Tuple[str, str]]) -> float:
        if not pairs or not self.transformations:
            return 0.0
        return max(
            sum(1 for src, tgt in pairs if t.covers(src, tgt)) / len(pairs)
            for t in self.transformations
        )


def autojoin(
    pairs: Sequence[Tuple[str, str]],
    *,
    subset_size: int = 2,
    n_subsets: int = 6,
    config: AutoJoinConfig | None = None,
    total_time_limit_sec: float = 60.0,
    seed: int = 0,
) -> AutoJoinResult:
    """Run Auto-Join over random subsets and aggregate transformations.

    ``total_time_limit_sec`` is the analogue of the paper's 650,000 s
    cap: when it is exceeded the run stops and is flagged ``timed_out``
    (the paper then scores the run as coverage 0 at the cap time).
    """
    if config is None:
        config = AutoJoinConfig()
    t0 = time.perf_counter()
    rng = random.Random(seed)
    work = list(pairs)
    found: List[Transformation] = []
    seen: Set[Transformation] = set()
    timed_out = False
    # Fair time slicing: a noisy subset forces an exhaustive search (the
    # paper's worst case), so each subset gets an equal share of the
    # total cap — one bad draw cannot starve the remaining subsets.
    slice_sec = total_time_limit_sec / max(n_subsets, 1)
    for _ in range(n_subsets):
        remaining = total_time_limit_sec - (time.perf_counter() - t0)
        if remaining <= 0:
            timed_out = True
            break
        if not work:
            break
        subset = (
            rng.sample(work, subset_size) if len(work) > subset_size else list(work)
        )
        sub_config = replace(
            config,
            time_limit_sec=min(config.time_limit_sec, remaining, slice_sec),
        )
        t = autojoin_single(subset, sub_config)
        if time.perf_counter() - t0 >= total_time_limit_sec:
            timed_out = True
        if t is not None and t not in seen:
            seen.add(t)
            found.append(t)
    covers = [
        {i for i, (s, g) in enumerate(work) if t.covers(s, g)} for t in found
    ]
    return AutoJoinResult(
        transformations=found,
        covers=covers,
        n_pairs=len(work),
        elapsed_sec=time.perf_counter() - t0,
        timed_out=timed_out,
    )
