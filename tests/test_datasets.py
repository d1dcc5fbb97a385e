"""Dataset generators: §6.1 synthetic pairs + simulated real stand-ins."""
import pytest

from repro.core import discover
from repro.datasets import (
    TOPICS,
    generate_open_data,
    generate_synth,
    generate_topic_pair,
    synth_suite,
    web_benchmark,
)


class TestSynth:
    def test_row_counts_and_lengths(self):
        tp = generate_synth(50, seed=1)
        assert len(tp.source) == len(tp.target) == 50
        assert all(20 <= len(s) <= 35 for s in tp.source)

    def test_long_rows(self):
        tp = generate_synth(50, long_rows=True, seed=2)
        assert all(40 <= len(s) <= 70 for s in tp.source)

    def test_three_golden_transformations(self):
        tp = generate_synth(50, seed=3)
        assert len(tp.golden_transformations) == 3

    def test_each_target_derived_from_a_golden_transformation(self):
        tp = generate_synth(40, seed=4)
        for (i, j) in tp.golden:
            src, tgt = tp.source[i], tp.target[j]
            assert any(t.apply(src) == tgt for t in tp.golden_transformations)

    def test_deterministic(self):
        a = generate_synth(30, seed=7)
        b = generate_synth(30, seed=7)
        assert a.source == b.source and a.target == b.target

    def test_different_seeds_differ(self):
        a = generate_synth(30, seed=7)
        b = generate_synth(30, seed=8)
        assert a.source != b.source

    def test_suite_size(self):
        suite = synth_suite(20, n_tables=3, seed=0)
        assert len(suite) == 3
        assert len({tuple(tp.source) for tp in suite}) == 3

    def test_discovery_recovers_cover(self):
        # The discovery algorithm must fully cover a synthetic pair with
        # (about) as many transformations as the generator used.
        tp = generate_synth(30, seed=11)
        res = discover(tp.golden_text_pairs())
        assert res.set_coverage == 1.0
        assert len(res.cover_set) <= 6

    def test_golden_pairs_shape(self):
        tp = generate_synth(25, seed=5)
        assert tp.golden == [(i, i) for i in range(25)]


class TestWebBenchmark:
    def test_31_tables(self):
        tables = web_benchmark(n_rows=20, seed=0)
        assert len(tables) == 31

    def test_topics_all_used(self):
        assert len(TOPICS) == 17

    @pytest.mark.parametrize("topic", sorted(TOPICS))
    def test_topic_pair_valid(self, topic):
        tp = generate_topic_pair(topic, n_rows=30, noise_frac=0.0, seed=1)
        assert len(tp.source) == len(tp.target) == 30
        assert len(set(tp.source)) == 30  # join keys unique
        assert all(tp.source) and all(tp.target)

    @pytest.mark.parametrize("topic", sorted(TOPICS))
    def test_clean_topic_is_discoverable(self, topic):
        # Without noise every topic pair must be fully coverable by a
        # small transformation set.
        tp = generate_topic_pair(topic, n_rows=25, noise_frac=0.0, seed=2)
        res = discover(tp.golden_text_pairs())
        assert res.set_coverage == 1.0, topic
        assert len(res.cover_set) <= 6, topic

    def test_noise_rows_break_rules(self):
        clean = generate_topic_pair("phone_paren", n_rows=40, noise_frac=0.0, seed=3)
        noisy = generate_topic_pair("phone_paren", n_rows=40, noise_frac=0.3, seed=3)
        assert clean.target != noisy.target

    def test_deterministic(self):
        a = generate_topic_pair("date_iso", n_rows=15, seed=9)
        b = generate_topic_pair("date_iso", n_rows=15, seed=9)
        assert a.source == b.source and a.target == b.target

    def test_avg_entry_length_in_benchmark_ballpark(self):
        # paper: average join entry length ≈ 31 chars; ours should be
        # the same order of magnitude (10–40)
        tables = web_benchmark(n_rows=30, seed=1)
        avg = sum(tp.avg_source_len() for tp in tables) / len(tables)
        assert 10 <= avg <= 40


class TestOpenData:
    def test_row_count(self):
        tp = generate_open_data(500, seed=0)
        assert len(tp.source) == 500

    def test_three_rules(self):
        tp = generate_open_data(300, seed=1)
        res = discover(tp.golden_text_pairs(), sample_size=60, seed=0)
        assert res.set_coverage >= 0.95
        assert len(res.cover_set) <= 6

    def test_shared_ngrams_across_rows(self):
        # the precision-killing property: many rows share house/street
        # prefixes of length ≥ 4
        tp = generate_open_data(400, seed=2)
        prefixes = [s[:6] for s in tp.source]
        assert len(set(prefixes)) < len(prefixes) / 2

    def test_deterministic(self):
        a = generate_open_data(100, seed=3)
        b = generate_open_data(100, seed=3)
        assert a.source == b.source and a.target == b.target
