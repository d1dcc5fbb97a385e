"""Distributed transformation discovery and transform-join (DESIGN.md §2.8).

The single-machine pipeline of :mod:`repro.core.discover` lifted onto
Spark DataFrames:

- **generation** — ``mapInPandas`` over candidate (src, tgt) pairs:
  each partition runs placeholder/skeleton/unit inference and emits
  serialized transformations (locally deduplicated) plus its raw
  generated count; global dedup is a DataFrame aggregation.
- **coverage** — ``mapInPandas`` over row pairs with the deduplicated
  transformation list broadcast; partitions keep per-row negative-unit
  caches and emit (transformation id, row id) coverage edges plus
  cache-statistics rows; coverage counts aggregate with ``groupBy``.
- **solution** — greedy set cover on the driver over the (tiny)
  coverage edges, identical to the local path.
- **join** — the learned transformations applied to the source column
  with a pandas UDF, then an ordinary equi-join on the transformed
  column (checked against DuckDB in tests).
"""
from __future__ import annotations

import time
from typing import Iterator, List, Optional, Sequence, Set, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    ArrayType,
    LongType,
    StringType,
    StructField,
    StructType,
)

from .coverage import CoverageStats, compute_coverage
from .discover import DiscoveryResult
from .generate import DiscoveryConfig, GenerationStats, generate_for_pair
from .setcover import greedy_min_cover, top_k_by_coverage
from .units import Transformation, deserialize

_GEN_SCHEMA = StructType(
    [
        StructField("trans", StringType()),
        StructField("n_generated", LongType()),
    ]
)

_COV_SCHEMA = StructType(
    [
        StructField("trans_id", LongType()),
        StructField("row_id", LongType()),
        StructField("n_checks", LongType()),
        StructField("n_cache_hits", LongType()),
    ]
)


def generate_spark(
    spark: SparkSession,
    pairs_df: DataFrame,
    config: DiscoveryConfig | None = None,
) -> Tuple[DataFrame, int]:
    """Distributed candidate generation.

    ``pairs_df`` has columns (src, tgt). Returns a DataFrame with a
    single ``trans`` column of distinct serialized transformations, and
    the raw pre-dedup generated count (Table 3's "Generated trans.").
    """
    if config is None:
        config = DiscoveryConfig()

    def gen(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            seen: Set[str] = set()
            n_gen = 0
            for src, tgt in zip(pdf["src"], pdf["tgt"]):
                cands, n = generate_for_pair(src, tgt, config)
                n_gen += n
                for t in cands:
                    seen.add(t.serialize())
            trans_list: List[Optional[str]] = sorted(seen) or [None]
            yield pd.DataFrame(
                {
                    "trans": trans_list,
                    "n_generated": [n_gen] + [0] * (len(trans_list) - 1),
                }
            )

    raw = pairs_df.select("src", "tgt").mapInPandas(gen, _GEN_SCHEMA)
    n_generated = raw.agg(F.sum("n_generated")).collect()[0][0] or 0
    distinct = raw.where(F.col("trans").isNotNull()).select("trans").distinct()
    return distinct, int(n_generated)


def coverage_spark(
    spark: SparkSession,
    pairs_df: DataFrame,
    transformations: Sequence[Transformation],
    *,
    use_cache: bool = True,
) -> Tuple[DataFrame, CoverageStats]:
    """Distributed coverage: (trans_id, row_id) edges + cache stats.

    ``pairs_df`` must carry (row_id, src, tgt). The transformation list
    is broadcast to executors in serialized form; each partition runs
    the cached evaluator over its rows (the negative-unit cache is
    per-row state, so row-partitioning parallelizes it exactly).
    """
    sc = spark.sparkContext
    b_trans = sc.broadcast([t.serialize() for t in transformations])

    def cover(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        trans = [deserialize(s) for s in b_trans.value]
        for pdf in batches:
            rows = list(zip(pdf["src"], pdf["tgt"]))
            stats = CoverageStats()
            covers = compute_coverage(trans, rows, use_cache=use_cache, stats=stats)
            edges_t, edges_r = [], []
            for ti, cov in enumerate(covers):
                for ri in cov:
                    edges_t.append(ti)
                    edges_r.append(int(pdf["row_id"].iloc[ri]))
            n = len(edges_t)
            yield pd.DataFrame(
                {
                    "trans_id": edges_t + [-1],
                    "row_id": edges_r + [-1],
                    "n_checks": [0] * n + [stats.n_checks],
                    "n_cache_hits": [0] * n + [stats.n_cache_hits],
                }
            )

    out = pairs_df.select("row_id", "src", "tgt").mapInPandas(cover, _COV_SCHEMA)
    out = out.cache()
    agg = out.agg(F.sum("n_checks"), F.sum("n_cache_hits")).collect()[0]
    stats = CoverageStats(int(agg[0] or 0), int(agg[1] or 0))
    edges = out.where(F.col("trans_id") >= 0).select("trans_id", "row_id")
    return edges, stats


def discover_spark(
    spark: SparkSession,
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
    n_partitions: Optional[int] = None,
) -> DiscoveryResult:
    """Distributed end-to-end discovery with the same semantics as
    :func:`repro.core.discover.discover` (equivalence is tested)."""
    import random

    if config is None:
        config = DiscoveryConfig()
    t0 = time.perf_counter()
    work: List[Tuple[str, str]] = list(pairs)
    if sample_size is not None and len(work) > sample_size:
        work = random.Random(seed).sample(work, sample_size)
    if not work:
        return DiscoveryResult(
            transformations=[], covers=[], top=[], cover_set=[], n_pairs=0,
            gen_stats=GenerationStats(), cov_stats=CoverageStats(),
            elapsed_sec=time.perf_counter() - t0,
        )

    n_part = n_partitions or min(16, max(1, len(work) // 4))
    pairs_df = spark.createDataFrame(
        [(i, s, t) for i, (s, t) in enumerate(work)], ["row_id", "src", "tgt"]
    ).repartition(n_part)

    trans_df, n_generated = generate_spark(spark, pairs_df, config)
    # Deterministic order so tie-breaks match across runs.
    serialized = [r[0] for r in trans_df.orderBy("trans").collect()]
    transformations = [deserialize(s) for s in serialized]
    gen_stats = GenerationStats(n_generated=n_generated, n_unique=len(transformations))

    edges_df, cov_stats = coverage_spark(
        spark, pairs_df, transformations, use_cache=use_cache
    )
    covers: List[Set[int]] = [set() for _ in transformations]
    for row in edges_df.collect():
        covers[row["trans_id"]].add(row["row_id"])

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


def transform_join(
    source_df: DataFrame,
    target_df: DataFrame,
    transformations: Sequence[Transformation],
    *,
    src_col: str = "text",
    tgt_col: str = "text",
) -> DataFrame:
    """Equi-join after applying the learned transformations (§4.2).

    Every transformation is applied to the source join column with a
    pandas UDF; the exploded (row, transformed) pairs equi-join with
    the target column — a plain Catalyst join on the transformed key.
    Output columns: every source column, ``transformed``, and every
    target column suffixed ``_tgt`` where names collide.
    """
    serialized = [t.serialize() for t in transformations]

    @F.pandas_udf(ArrayType(StringType()))
    def apply_all(col: pd.Series) -> pd.Series:
        trans = [deserialize(s) for s in serialized]
        def _apply(v):
            outs = {t.apply(v) for t in trans}
            outs.discard(None)
            return list(outs)
        return col.map(_apply)

    exploded = source_df.withColumn(
        "transformed", F.explode(apply_all(F.col(src_col)))
    )
    tgt_renamed = target_df
    for c in target_df.columns:
        if c in exploded.columns:
            tgt_renamed = tgt_renamed.withColumnRenamed(c, f"{c}_tgt")
    join_key = f"{tgt_col}_tgt" if tgt_col in exploded.columns else tgt_col
    return exploded.join(
        tgt_renamed, exploded["transformed"] == tgt_renamed[join_key], "inner"
    )
