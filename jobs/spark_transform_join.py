#!/usr/bin/env python
"""End-to-end distributed transform-join demo (spark-submit entrypoint).

Pipeline (§4.2): n-gram row matching → distributed discovery →
transform-equi-join, on a simulated benchmark topic pair and on the
TPC-H-lite dirty-order-key scenario.

Usage: spark-submit jobs/spark_transform_join.py   (or plain python)
"""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).resolve().parents[1] / "src"))

from pyspark.sql import SparkSession, functions as F  # noqa: E402

from repro import synth_data  # noqa: E402
from repro.core import discover  # noqa: E402
from repro.core.spark_discover import discover_spark, transform_join  # noqa: E402
from repro.datasets import generate_topic_pair  # noqa: E402
from repro.rowmatch import match_rows_spark  # noqa: E402


def main() -> None:
    spark = (
        SparkSession.builder.appName("repro-transform-join")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )

    # 1. Benchmark topic pair: match rows, learn rules, join.
    tp = generate_topic_pair("phone_paren", n_rows=92, noise_frac=0.05, seed=0)
    src_df, tgt_df = tp.to_spark(spark)
    matched = match_rows_spark(src_df, tgt_df).collect()
    pairs = [(tp.source[r["src_id"]], tp.target[r["tgt_id"]]) for r in matched]
    res = discover_spark(spark, pairs)
    trans = [t for t, _ in res.cover_set]
    print(f"[phone_paren] matched={len(matched)} rules={len(trans)}")
    for t, cov in res.cover_set:
        print(f"  covers {len(cov):3d}: {t}")
    joined = transform_join(
        src_df.withColumnRenamed("row_id", "src_id"),
        tgt_df.withColumnRenamed("row_id", "tgt_id"),
        trans,
    )
    n_correct = joined.where(F.col("src_id") == F.col("tgt_id")).count()
    print(f"[phone_paren] joined={joined.count()} correct={n_correct}/{len(tp.source)}")

    # 2. TPC-H-lite: dirty textual order keys re-joined to orders.
    dirty = synth_data.orders_formatted(spark, sf=0.01).select(
        "o_orderkey", F.col("o_orderkey_text").alias("text")
    )
    sample = dirty.limit(100).collect()
    res2 = discover([(r["text"], str(r["o_orderkey"])) for r in sample])
    trans2 = [t for t, _ in res2.cover_set]
    print(f"[tpch] rules={len(trans2)}: {[str(t) for t in trans2]}")
    orders = synth_data.orders(spark, sf=0.01).withColumn(
        "o_key_str", F.col("o_orderkey").cast("string")
    )
    joined2 = transform_join(dirty, orders, trans2, tgt_col="o_key_str")
    total = dirty.count()
    correct = joined2.where(
        F.col("o_orderkey").cast("string") == F.col("o_key_str")
    ).count()
    print(f"[tpch] dirty_rows={total} correctly_joined={correct}")

    spark.stop()


if __name__ == "__main__":
    main()
