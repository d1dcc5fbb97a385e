"""Single-machine transformation-discovery driver (paper §4.1, §5.1).

Pipeline: (1) generate candidate transformations from every input pair
via placeholders → skeletons → unit inference, (2) hash-dedup, (3)
compute coverage with the negative-unit cache, (4) compile the top-k /
greedy minimal covering set. The distributed variant with identical
semantics lives in :mod:`repro.core.spark_discover`.
"""
from __future__ import annotations

import random
import time
from dataclasses import dataclass, field
from typing import List, Optional, Sequence, Set, Tuple

from .coverage import CoverageStats, compute_coverage
from .generate import DiscoveryConfig, GenerationStats, generate_for_pairs
from .setcover import greedy_min_cover, top_k_by_coverage
from .units import Transformation


@dataclass
class DiscoveryResult:
    """Everything Tables 2 and 3 report for one run."""

    transformations: List[Transformation]
    covers: List[Set[int]]
    top: List[Tuple[Transformation, Set[int]]]
    cover_set: List[Tuple[Transformation, Set[int]]]
    n_pairs: int
    gen_stats: GenerationStats
    cov_stats: CoverageStats
    elapsed_sec: float

    @property
    def top_coverage(self) -> float:
        """Coverage fraction of the single best transformation."""
        if not self.top or self.n_pairs == 0:
            return 0.0
        return len(self.top[0][1]) / self.n_pairs

    @property
    def set_coverage(self) -> float:
        """Coverage fraction of the greedy covering set."""
        if self.n_pairs == 0:
            return 0.0
        covered: Set[int] = set()
        for _, c in self.cover_set:
            covered |= c
        return len(covered) / self.n_pairs

    def coverage_over(self, pairs: Sequence[Tuple[str, str]]) -> float:
        """Coverage of the covering set over an *external* pair list.

        Used to score a covering set learned from (possibly noisy or
        sampled) matched pairs against the golden pairs.
        """
        if not pairs:
            return 0.0
        n = sum(
            1
            for src, tgt in pairs
            if any(t.covers(src, tgt) for t, _ in self.cover_set)
        )
        return n / len(pairs)

    def top_coverage_over(self, pairs: Sequence[Tuple[str, str]]) -> float:
        if not pairs or not self.top:
            return 0.0
        t = self.top[0][0]
        return sum(1 for src, tgt in pairs if t.covers(src, tgt)) / len(pairs)


def discover(
    pairs: Sequence[Tuple[str, str]],
    config: DiscoveryConfig | None = None,
    *,
    top_k: int = 3,
    min_support: int = 0,
    min_support_frac: float = 0.0,
    sample_size: Optional[int] = None,
    use_cache: bool = True,
    exclude_pure_literals: bool = True,
    seed: int = 0,
) -> DiscoveryResult:
    """Run the full discovery pipeline on matched (source, target) pairs.

    ``sample_size`` caps the number of pairs used for *generation and
    coverage* (the §5.3 sampling strategy for large inputs); support
    thresholds are expressed either as an absolute row count
    (``min_support``) or a fraction of the input (``min_support_frac``,
    the paper's 1% knob for Open data).
    """
    if config is None:
        config = DiscoveryConfig()
    t0 = time.perf_counter()
    work: List[Tuple[str, str]] = list(pairs)
    if sample_size is not None and len(work) > sample_size:
        rng = random.Random(seed)
        work = rng.sample(work, sample_size)

    transformations, gen_stats = generate_for_pairs(work, config)
    cov_stats = CoverageStats()
    covers = compute_coverage(
        transformations, work, use_cache=use_cache, stats=cov_stats
    )
    support = max(min_support, int(min_support_frac * len(work)))
    top = top_k_by_coverage(
        transformations, covers, k=top_k, exclude_pure_literals=exclude_pure_literals
    )
    cover_set = greedy_min_cover(
        transformations,
        covers,
        len(work),
        min_support=support,
        exclude_pure_literals=exclude_pure_literals,
    )
    return DiscoveryResult(
        transformations=transformations,
        covers=covers,
        top=top,
        cover_set=cover_set,
        n_pairs=len(work),
        gen_stats=gen_stats,
        cov_stats=cov_stats,
        elapsed_sec=time.perf_counter() - t0,
    )
