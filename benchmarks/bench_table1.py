"""Benchmark behind Table 1 — row-matching throughput per dataset.

One pytest-benchmark case per dataset row of Table 1, at SF-appropriate
sizes (benchmarks target ~100 MB-scale equivalents of the paper's
inputs; the full-size numbers come from ``jobs/table1_row_matching.py``).
Each case asserts the quality signature the paper reports (high
recall everywhere; precision collapse on Open data) so a regression in
matching quality fails the bench, not just slows it.
"""
import pytest

from repro.datasets import generate_open_data, generate_synth, generate_topic_pair
from repro.rowmatch import match_rows_local, score_matching


def _run(tp):
    pairs = match_rows_local(tp.source, tp.target)
    return score_matching(pairs, tp.golden)


@pytest.mark.benchmark(group="table1-rowmatch")
def test_bench_rowmatch_benchmark(benchmark):
    tp = generate_topic_pair("name_reversal", n_rows=92, noise_frac=0.08, seed=0)
    m = benchmark.pedantic(_run, args=(tp,), rounds=3, iterations=1)
    assert m.recall >= 0.7


@pytest.mark.benchmark(group="table1-rowmatch")
def test_bench_rowmatch_open_data(benchmark):
    tp = generate_open_data(1000, seed=0)
    m = benchmark.pedantic(_run, args=(tp,), rounds=1, iterations=1)
    assert m.recall >= 0.8
    assert m.precision < 0.3  # the paper's precision collapse


@pytest.mark.benchmark(group="table1-rowmatch")
def test_bench_rowmatch_synth50(benchmark):
    tp = generate_synth(50, seed=0)
    m = benchmark.pedantic(_run, args=(tp,), rounds=3, iterations=1)
    assert m.recall >= 0.7


@pytest.mark.benchmark(group="table1-rowmatch")
def test_bench_rowmatch_synth50L(benchmark):
    tp = generate_synth(50, long_rows=True, seed=0)
    m = benchmark.pedantic(_run, args=(tp,), rounds=3, iterations=1)
    assert m.recall >= 0.7


@pytest.mark.benchmark(group="table1-rowmatch")
def test_bench_rowmatch_synth500(benchmark):
    tp = generate_synth(500, seed=0)
    m = benchmark.pedantic(_run, args=(tp,), rounds=1, iterations=1)
    assert m.recall >= 0.7


@pytest.mark.benchmark(group="table1-rowmatch")
def test_bench_rowmatch_synth500L(benchmark):
    tp = generate_synth(500, long_rows=True, seed=0)
    m = benchmark.pedantic(_run, args=(tp,), rounds=1, iterations=1)
    assert m.recall >= 0.7


@pytest.mark.benchmark(group="table1-rowmatch-spark")
def test_bench_rowmatch_spark(benchmark, spark):
    """The distributed inverted-index join at benchmark scale."""
    from repro.rowmatch import match_rows_spark

    tp = generate_open_data(1000, seed=1)
    src_df, tgt_df = tp.to_spark(spark)
    src_df.cache().count(), tgt_df.cache().count()

    def run():
        return match_rows_spark(src_df, tgt_df).count()

    n = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n >= 1000
