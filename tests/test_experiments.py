"""Experiment harness smoke tests (tiny sizes — full runs live in jobs/)."""
from repro.datasets import generate_synth
from repro.experiments import (
    DatasetSpec,
    run_table1,
    run_table2,
    run_table3,
    standard_datasets,
)


def _tiny_specs():
    return [
        DatasetSpec("Synth-tiny", [generate_synth(15, seed=1)]),
        DatasetSpec(
            "Synth-tiny-sampled",
            [generate_synth(15, seed=2)],
            sample_size=10,
            min_support_frac=0.01,
        ),
    ]


class TestStandardDatasets:
    def test_six_datasets_in_paper_order(self):
        specs = standard_datasets(
            scale=0.1, n_synth_tables=1, n_synth_tables_500=1, open_rows=100
        )
        assert [s.name for s in specs] == [
            "Benchmark",
            "Open data",
            "Synth-50",
            "Synth-50L",
            "Synth-500",
            "Synth-500L",
        ]
        assert len(specs[0].tables) == 31
        assert specs[1].min_support_frac == 0.01


class TestTable1:
    def test_rows_and_metrics(self):
        rows = run_table1(_tiny_specs())
        assert len(rows) == 2
        for r in rows:
            assert r.n_rows == 15
            assert 0.0 <= r.precision <= 1.0
            assert 0.0 <= r.recall <= 1.0


class TestTable2:
    def test_both_matchings(self):
        rows = run_table2(
            _tiny_specs(), run_autojoin=True, autojoin_cap_sec=2.0
        )
        assert len(rows) == 4  # 2 matchings × 2 datasets
        assert {r.matching for r in rows} == {"ngram", "golden"}
        golden = [r for r in rows if r.matching == "golden"]
        for r in golden:
            assert r.coverage >= 0.9  # clean synthetic input
            assert r.time_sec < 30

    def test_without_autojoin(self):
        rows = run_table2(_tiny_specs()[:1], run_autojoin=False)
        assert all(r.aj_time_sec == 0.0 for r in rows)


class TestTable3:
    def test_pruning_stats(self):
        rows = run_table3(_tiny_specs())
        for r in rows:
            assert r.generated >= r.to_try > 0
            assert 0.0 <= r.duplicate_frac < 1.0
            assert 0.0 <= r.cache_hit_ratio <= 1.0
