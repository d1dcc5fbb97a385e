"""End-to-end pipelines: match → discover → transform-join, with oracle checks."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.core import discover
from repro.core.spark_discover import discover_spark, transform_join
from repro.datasets import generate_open_data, generate_synth, generate_topic_pair
from repro.oracle import assert_equivalent
from repro.rowmatch import match_rows_local, score_matching


class TestPipelineLocal:
    def test_synth_pipeline_ngram_matching(self):
        """Full §4.2 pipeline on a synthetic pair: n-gram matching feeds
        discovery; learned rules must cover (nearly) all golden pairs."""
        tp = generate_synth(40, seed=31)
        matched = match_rows_local(tp.source, tp.target)
        matched_pairs = [(tp.source[i], tp.target[j]) for i, j in matched]
        res = discover(matched_pairs)
        assert res.coverage_over(tp.golden_text_pairs()) >= 0.9

    def test_benchmark_pipeline(self):
        tp = generate_topic_pair("date_iso", n_rows=40, noise_frac=0.0, seed=7)
        matched = match_rows_local(tp.source, tp.target)
        m = score_matching(matched, tp.golden)
        assert m.recall >= 0.8
        matched_pairs = [(tp.source[i], tp.target[j]) for i, j in matched]
        res = discover(matched_pairs)
        assert res.coverage_over(tp.golden_text_pairs()) >= 0.9

    def test_open_data_pipeline_with_sampling_and_support(self):
        """The paper's §6.4 recipe: noisy matching → sample → support
        threshold; the learned set still covers the golden pairs."""
        tp = generate_open_data(300, seed=5)
        matched = match_rows_local(tp.source, tp.target)
        m = score_matching(matched, tp.golden)
        assert m.precision < 0.6  # noisy, as designed
        matched_pairs = [(tp.source[i], tp.target[j]) for i, j in matched]
        res = discover(
            matched_pairs, sample_size=150, min_support_frac=0.01, seed=1
        )
        assert res.coverage_over(tp.golden_text_pairs()) >= 0.9


@pytest.mark.spark
class TestPipelineSpark:
    def test_full_spark_pipeline(self, spark):
        from repro.rowmatch import match_rows_spark

        tp = generate_topic_pair("phone_paren", n_rows=35, noise_frac=0.0, seed=9)
        src_df, tgt_df = tp.to_spark(spark)
        matched = match_rows_spark(src_df, tgt_df).collect()
        matched_pairs = [
            (tp.source[r["src_id"]], tp.target[r["tgt_id"]]) for r in matched
        ]
        res = discover_spark(spark, matched_pairs)
        trans = [t for t, _ in res.cover_set]
        joined = transform_join(
            src_df.withColumnRenamed("row_id", "src_id"),
            tgt_df.withColumnRenamed("row_id", "tgt_id"),
            trans,
        )
        got = {(r["src_id"], r["tgt_id"]) for r in joined.collect()}
        assert got >= set(tp.golden)


@pytest.mark.spark
class TestTpchJoinability:
    """TPC-H-lite substrate: dirty textual order keys re-joined to orders."""

    def test_formatted_orders_schema(self, spark):
        df = synth_data.orders_formatted(spark, sf=0.001)
        assert "o_orderkey_text" in df.columns
        row = df.first()
        assert str(row["o_orderkey"]) in row["o_orderkey_text"]

    def test_transform_join_recovers_equi_join(self, spark):
        dirty = synth_data.orders_formatted(spark, sf=0.001).select(
            "o_orderkey", "o_orderkey_text"
        )
        pdf = dirty.toPandas()
        # train on a small tagged sample (§4.2.1's "analogous to
        # training data"), then join the whole table
        sample = pdf.head(60)
        pairs = [
            (t, str(k)) for t, k in zip(sample["o_orderkey_text"], sample["o_orderkey"])
        ]
        res = discover(pairs)
        assert res.set_coverage == 1.0
        trans = [t for t, _ in res.cover_set]
        assert len(trans) <= 4

        orders_str = (
            synth_data.orders(spark, sf=0.001)
            .withColumn("o_key_str", F.col("o_orderkey").cast("string"))
            .select("o_key_str", F.col("o_totalprice").alias("price"))
        )
        joined = transform_join(
            dirty.select(F.col("o_orderkey_text").alias("text"), "o_orderkey"),
            orders_str,
            trans,
            tgt_col="o_key_str",
        ).select(
            F.col("o_orderkey").alias("dirty_key"),
            F.col("o_key_str").alias("clean_key"),
            "price",
        )
        # every dirty row joins exactly its own order
        n_orders = synth_data.orders(spark, sf=0.001).count()
        assert joined.count() == n_orders
        assert joined.where(
            F.col("dirty_key").cast("string") != F.col("clean_key")
        ).count() == 0

        # oracle: DuckDB recovers the same join by parsing the number
        orders_pdf = synth_data.orders(spark, sf=0.001).toPandas()
        orders_pdf["o_key_str"] = orders_pdf["o_orderkey"].astype(str)
        assert_equivalent(
            joined,
            """
            SELECT d.o_orderkey AS dirty_key, o.o_key_str AS clean_key,
                   o.o_totalprice AS price
            FROM dirty d JOIN ord o
              ON regexp_extract(d.o_orderkey_text, '([0-9]+)', 1) = o.o_key_str
            """,
            dirty=pdf,
            ord=orders_pdf[["o_key_str", "o_totalprice", "o_orderkey"]],
        )
