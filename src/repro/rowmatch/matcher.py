"""Candidate joinable-pair matching — Algorithm 1, as Spark dataflow.

The distributed implementation is pure DataFrame/Catalyst: rows explode
into their n-grams, document frequencies aggregate per column, Rscore
is a join of the two frequency tables, representatives are a window
argmax per (source row, gram size), and candidate pairs come from the
inverted-index equi-join of representatives with target grams. A
row-for-row equivalent single-machine reference (``match_rows_local``)
backs the Spark-vs-local equivalence tests.
"""
from __future__ import annotations

from typing import List, Sequence, Set, Tuple

from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F
from pyspark.sql.types import ArrayType, StringType

from .ngrams import ngrams_of, row_frequencies


def _gram_table(df: DataFrame, id_col: str, text_col: str, n0: int, nmax: int) -> DataFrame:
    """(id, gram) — one row per distinct n-gram of each input row."""
    extract = F.udf(
        lambda t: list(ngrams_of(t or "", n0, nmax)), ArrayType(StringType())
    )
    return (
        df.select(F.col(id_col).alias("id"), F.explode(extract(F.col(text_col))).alias("gram"))
    )


def match_rows_spark(
    source_df: DataFrame,
    target_df: DataFrame,
    *,
    id_col: str = "row_id",
    text_col: str = "text",
    n0: int = 4,
    nmax: int = 20,
) -> DataFrame:
    """Candidate joinable pairs as a DataFrame (src_id, tgt_id).

    Inputs carry one string row per record. The source column should be
    the more informative one (longer values on average, §4.2.1); the
    caller orients the tables.
    """
    src_grams = _gram_table(source_df, id_col, text_col, n0, nmax).alias("sg")
    tgt_grams = _gram_table(target_df, id_col, text_col, n0, nmax).alias("tg")

    # IRF denominators per column; inner join keeps grams occurring in
    # both columns — grams absent from one side score 0 and can never
    # yield a candidate pair.
    src_freq = src_grams.groupBy("gram").agg(F.count("*").alias("df_s"))
    tgt_freq = tgt_grams.groupBy("gram").agg(F.count("*").alias("df_t"))
    scores = src_freq.join(tgt_freq, "gram").select(
        "gram", (1.0 / (F.col("df_s") * F.col("df_t"))).alias("rscore")
    )

    # Representative n-gram per (source row, gram size): Rscore argmax,
    # ties to the lexicographically smallest gram for determinism.
    scored = src_grams.join(scores, "gram").select(
        "id", F.length("gram").alias("n"), "gram", "rscore"
    )
    w = Window.partitionBy("id", "n").orderBy(F.desc("rscore"), F.asc("gram"))
    reps = (
        scored.withColumn("rk", F.row_number().over(w))
        .where(F.col("rk") == 1)
        .select(F.col("id").alias("src_id"), "gram")
        .distinct()
    )

    # Inverted-index join: target rows containing a representative gram.
    return (
        reps.join(tgt_grams, "gram")
        .select("src_id", F.col("id").alias("tgt_id"))
        .distinct()
    )


def match_rows_local(
    sources: Sequence[str],
    targets: Sequence[str],
    *,
    n0: int = 4,
    nmax: int = 20,
) -> List[Tuple[int, int]]:
    """Single-machine Algorithm 1, index-based ids; mirrors the Spark path."""
    src_freq = row_frequencies(sources, n0, nmax)
    tgt_freq = row_frequencies(targets, n0, nmax)
    tgt_grams: List[Set[str]] = [ngrams_of(t, n0, nmax) for t in targets]
    inverted: dict = {}
    for tid, grams in enumerate(tgt_grams):
        for g in grams:
            inverted.setdefault(g, []).append(tid)

    pairs: Set[Tuple[int, int]] = set()
    for sid, text in enumerate(sources):
        grams = ngrams_of(text, n0, nmax)
        by_size: dict = {}
        for g in grams:
            if g not in tgt_freq:
                continue
            score = 1.0 / (src_freq[g] * tgt_freq[g])
            n = len(g)
            cur = by_size.get(n)
            # argmax with the same tie-break as the Spark window
            if cur is None or score > cur[0] or (score == cur[0] and g < cur[1]):
                by_size[n] = (score, g)
        for _, rep in by_size.values():
            for tid in inverted.get(rep, ()):
                pairs.add((sid, tid))
    return sorted(pairs)


def orient_tables(
    left: Sequence[str], right: Sequence[str]
) -> bool:
    """True when ``left`` should be the source (longer rows on average).

    §4.2.1: absent explicit tagging, the more informative (longer on
    average) column is the source.
    """
    avg_l = sum(map(len, left)) / max(len(left), 1)
    avg_r = sum(map(len, right)) / max(len(right), 1)
    return avg_l >= avg_r
