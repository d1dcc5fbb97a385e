"""Distributed discovery must match the single-machine path exactly."""
import pandas as pd
import pytest

from repro.core import DiscoveryConfig, discover
from repro.core.spark_discover import (
    coverage_spark,
    discover_spark,
    generate_spark,
    transform_join,
)
from repro.core.units import Literal, Split, SplitSubstr, deserialize, transformation
from repro.datasets import generate_synth, generate_topic_pair
from repro.oracle import assert_equivalent

FIG1_NAMES = [
    ("rafiei, davood", "d rafiei"),
    ("nascimento, mario a", "m a nascimento"),
    ("gingrich, douglas m", "d gingrich"),
    ("prus-czarnecki, andrzej", "a prus-czarnecki"),
    ("bowling, michael", "m bowling"),
    ("gosgnach, simon", "s gosgnach"),
]


@pytest.mark.spark
class TestGenerateSpark:
    def test_same_unique_set_as_local(self, spark):
        from repro.core.generate import generate_for_pairs

        local, stats = generate_for_pairs(FIG1_NAMES, DiscoveryConfig())
        pairs_df = spark.createDataFrame(
            [(i, s, t) for i, (s, t) in enumerate(FIG1_NAMES)],
            ["row_id", "src", "tgt"],
        ).repartition(3)
        trans_df, n_gen = generate_spark(spark, pairs_df)
        got = {r[0] for r in trans_df.collect()}
        assert got == {t.serialize() for t in local}
        assert n_gen == stats.n_generated


@pytest.mark.spark
class TestCoverageSpark:
    def test_same_edges_as_local(self, spark):
        from repro.core.coverage import compute_coverage
        from repro.core.generate import generate_for_pairs

        trans, _ = generate_for_pairs(FIG1_NAMES[:3], DiscoveryConfig())
        local_covers = compute_coverage(trans, FIG1_NAMES[:3])
        pairs_df = spark.createDataFrame(
            [(i, s, t) for i, (s, t) in enumerate(FIG1_NAMES[:3])],
            ["row_id", "src", "tgt"],
        ).repartition(2)
        edges_df, stats = coverage_spark(spark, pairs_df, trans)
        got = [set() for _ in trans]
        for r in edges_df.collect():
            got[r["trans_id"]].add(r["row_id"])
        assert got == local_covers
        assert stats.n_checks == len(trans) * 3


@pytest.mark.spark
class TestDiscoverSpark:
    def test_fig1_equivalence(self, spark):
        local = discover(FIG1_NAMES)
        dist = discover_spark(spark, FIG1_NAMES)
        assert dist.top_coverage == local.top_coverage == 5 / 6
        assert dist.set_coverage == local.set_coverage == 1.0
        assert len(dist.cover_set) == len(local.cover_set)
        assert set(dist.transformations) == set(local.transformations)
        assert dist.gen_stats.n_generated == local.gen_stats.n_generated
        assert dist.gen_stats.n_unique == local.gen_stats.n_unique

    def test_synth_equivalence(self, spark):
        tp = generate_synth(30, seed=21)
        pairs = tp.golden_text_pairs()
        local = discover(pairs)
        dist = discover_spark(spark, pairs)
        assert dist.top_coverage == local.top_coverage
        assert dist.set_coverage == local.set_coverage
        assert set(dist.transformations) == set(local.transformations)

    def test_cache_stats_partitioned(self, spark):
        # per-partition caches see fewer repeats than one global pass,
        # but the hit ratio must stay in a sane band
        dist = discover_spark(spark, FIG1_NAMES, n_partitions=2)
        assert 0.0 < dist.cov_stats.cache_hit_ratio < 1.0

    def test_empty(self, spark):
        res = discover_spark(spark, [])
        assert res.n_pairs == 0 and res.set_coverage == 0.0


@pytest.mark.spark
class TestTransformJoin:
    def test_fig1_join_with_oracle(self, spark):
        """End-to-end: learn rules, join, verify against DuckDB."""
        res = discover(FIG1_NAMES)
        trans = [t for t, _ in res.cover_set]
        src_df = spark.createDataFrame(
            [(i, s) for i, (s, _) in enumerate(FIG1_NAMES)], ["src_id", "text"]
        )
        tgt_df = spark.createDataFrame(
            [(i, t) for i, (_, t) in enumerate(FIG1_NAMES)], ["tgt_id", "text"]
        )
        joined = transform_join(src_df, tgt_df, trans).select(
            "src_id", "tgt_id"
        )
        # all six rows join to themselves
        got = {(r["src_id"], r["tgt_id"]) for r in joined.collect()}
        assert got == {(i, i) for i in range(6)}

        # oracle: DuckDB computes the same join from the transformed keys
        src_pdf = pd.DataFrame(
            [
                (i, out)
                for i, (s, _) in enumerate(FIG1_NAMES)
                for out in {t.apply(s) for t in trans}
                if out is not None
            ],
            columns=["src_id", "transformed"],
        )
        tgt_pdf = pd.DataFrame(
            [(i, t) for i, (_, t) in enumerate(FIG1_NAMES)],
            columns=["tgt_id", "text"],
        )
        assert_equivalent(
            joined,
            """
            SELECT DISTINCT s.src_id AS src_id, t.tgt_id AS tgt_id
            FROM src s JOIN tgt t ON s.transformed = t.text
            """,
            src=src_pdf,
            tgt=tgt_pdf,
        )

    def test_join_on_benchmark_topic(self, spark):
        tp = generate_topic_pair("course_code", n_rows=30, noise_frac=0.0, seed=4)
        res = discover(tp.golden_text_pairs())
        trans = [t for t, _ in res.cover_set]
        src_df, tgt_df = tp.to_spark(spark)
        joined = transform_join(
            src_df.withColumnRenamed("row_id", "src_id"),
            tgt_df.withColumnRenamed("row_id", "tgt_id"),
            trans,
        )
        got = {(r["src_id"], r["tgt_id"]) for r in joined.collect()}
        assert got >= set(tp.golden)  # every golden pair joins

    def test_no_transformations_empty_join(self, spark):
        src_df = spark.createDataFrame([(0, "a")], ["src_id", "text"])
        tgt_df = spark.createDataFrame([(0, "b")], ["tgt_id", "text"])
        assert transform_join(src_df, tgt_df, []).count() == 0
