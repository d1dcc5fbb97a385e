"""Candidate-unit inference and transformation generation (paper §4.1.4)."""
from hypothesis import given, settings, strategies as st

from repro.core.generate import (
    DiscoveryConfig,
    candidate_units,
    generate_for_pair,
    generate_for_pairs,
)
from repro.core.units import (
    Literal,
    Split,
    SplitSubstr,
    Substr,
    TwoCharSplitSubstr,
)

CFG = DiscoveryConfig()


class TestCandidateUnits:
    def test_every_candidate_produces_the_text(self):
        src, txt = "bowling, michael", "michael"
        for u in candidate_units(src, txt, CFG):
            assert u.apply(src) == txt

    def test_substr_inferred(self):
        units = candidate_units("abcdef", "cde", CFG)
        assert Substr(2, 5) in units

    def test_literal_always_candidate(self):
        units = candidate_units("abcdef", "cde", CFG)
        assert Literal("cde") in units

    def test_split_adjacent_delimiter(self):
        # ',' is adjacent to "a" and absent from it → Split(',', 0)
        units = candidate_units("a,b,c", "a", CFG)
        assert Split(",", 0) in units

    def test_split_piece_must_match_exactly(self):
        # "b" is flanked by commas; Split(',', 1) gives exactly "b".
        units = candidate_units("a,b,c", "b", CFG)
        assert Split(",", 1) in units

    def test_split_not_offered_when_piece_differs(self):
        # "ow" is inside a piece — no split char adjacent to it gives "ow"
        units = candidate_units("bowling, michael", "ow", CFG)
        assert not any(isinstance(u, Split) for u in units)

    def test_splitsubstr_inferred(self):
        # "m" from "bowling, michael": split on ' ' → piece 1 "michael",
        # substring [0,1)
        units = candidate_units("bowling, michael", "m", CFG)
        assert SplitSubstr(" ", 1, 0, 1) in units

    def test_splitsubstr_separator_delimiters(self):
        src, txt = "ab-cd", "cd"
        units = candidate_units(src, txt, CFG)
        assert SplitSubstr("-", 1, 0, 2) in units
        # non-separator, non-adjacent delimiters are excluded (their
        # SplitSubstr is coverage-dominated by the Substr candidate)
        assert not any(isinstance(u, SplitSubstr) and u.c == "a" for u in units)

    def test_no_split_with_char_inside_text(self):
        # delimiter occurring inside the placeholder text is invalid
        units = candidate_units("a-b-c", "a-b", CFG)
        assert not any(
            isinstance(u, (Split, SplitSubstr)) and u.c == "-" for u in units
        )

    def test_multiple_match_spans_all_used(self):
        units = candidate_units("abXab", "ab", CFG)
        assert Substr(0, 2) in units and Substr(3, 5) in units

    def test_twochar_excluded_by_default(self):
        units = candidate_units("a-b/c", "b", CFG)
        assert not any(isinstance(u, TwoCharSplitSubstr) for u in units)

    def test_twochar_enabled(self):
        cfg = DiscoveryConfig(use_twochar=True)
        units = candidate_units("a-b/c", "b", cfg)
        tcs = [u for u in units if isinstance(u, TwoCharSplitSubstr)]
        assert tcs and all(u.apply("a-b/c") == "b" for u in tcs)

    def test_candidate_cap(self):
        cfg = DiscoveryConfig(max_candidates_per_placeholder=2)
        units = candidate_units("ababababab", "ab", cfg)
        assert len(units) <= 3  # cap + the Literal

    def test_no_duplicates(self):
        units = candidate_units("aXaXa", "a", CFG)
        assert len(units) == len(set(units))


class TestPaperCartesianExample:
    """§4.1.4's worked example restricted to Substr and Literal."""

    SRC = "Victor Robbie Kasumba"

    def test_candidates_for_p1(self):
        cfg = DiscoveryConfig(use_split=False, use_splitsubstr=False)
        units = candidate_units(self.SRC, "Victor R", cfg)
        assert set(units) == {Substr(0, 8), Literal("Victor R")}

    def test_candidates_for_p2(self):
        cfg = DiscoveryConfig(use_split=False, use_splitsubstr=False)
        units = candidate_units(self.SRC, "Kasumba", cfg)
        assert set(units) == {Substr(14, 21), Literal("Kasumba")}

    def test_cartesian_product_four_transformations(self):
        cfg = DiscoveryConfig(use_split=False, use_splitsubstr=False)
        cands, _ = generate_for_pair(self.SRC, "Victor R. Kasumba", cfg)
        # Restrict to the keep-whole skeleton: P1 '. ' P2 with exactly
        # those two placeholders → exactly the paper's 4 combinations.
        four = [
            t
            for t in cands
            if len(t.units) == 3 and t.units[1] == Literal(". ")
        ]
        outs = {tuple(map(str, t.units)) for t in four}
        assert len(four) == 4
        assert ("Substr(0,8)", "Literal('. ')", "Substr(14,21)") in outs


class TestGenerateForPair:
    def test_every_generated_covers_its_pair(self):
        src, tgt = "bowling, michael", "m bowling"
        cands, _ = generate_for_pair(src, tgt, CFG)
        assert cands, "at least the all-literal transformation"
        for t in cands:
            assert t.covers(src, tgt), str(t)

    def test_generated_count_counts_duplicates(self):
        src, tgt = "Victor Robbie Kasumba", "Victor R. Kasumba"
        cands, n_gen = generate_for_pair(src, tgt, CFG)
        assert n_gen >= len(cands)

    def test_finds_fig1_style_transformation(self):
        src, tgt = "bowling, michael", "m bowling"
        cands, _ = generate_for_pair(src, tgt, CFG)
        # some candidate must use a non-literal unit for both "m" and
        # "bowling" — the generalizable transformation
        assert any(
            t.n_placeholders >= 2 and t.covers("gosgnach, simon", "s gosgnach")
            for t in cands
        )

    def test_identity_pair(self):
        cands, _ = generate_for_pair("same", "same", CFG)
        assert any(t.covers("same", "same") for t in cands)
        assert any(t.n_placeholders == 1 for t in cands)

    def test_unrelated_pair_gets_literal_only(self):
        cands, _ = generate_for_pair("abc", "xyz", CFG)
        assert len(cands) == 1 and cands[0].is_pure_literal()


class TestGenerateForPairs:
    PAIRS = [
        ("bowling, michael", "m bowling"),
        ("gosgnach, simon", "s gosgnach"),
        ("rafiei, davood", "d rafiei"),
    ]

    def test_dedup_across_rows(self):
        unique, stats = generate_for_pairs(self.PAIRS, CFG)
        assert stats.n_unique == len(unique) == len(set(unique))
        assert stats.n_generated > stats.n_unique  # shared transformations
        assert 0.0 < stats.duplicate_fraction < 1.0

    def test_shared_transformation_exists(self):
        unique, _ = generate_for_pairs(self.PAIRS, CFG)
        assert any(
            all(t.covers(s, g) for s, g in self.PAIRS) for t in unique
        )

    def test_empty_input(self):
        unique, stats = generate_for_pairs([], CFG)
        assert unique == [] and stats.n_generated == 0
        assert stats.duplicate_fraction == 0.0

    @settings(max_examples=25, deadline=None)
    @given(
        st.lists(
            st.tuples(
                st.text(alphabet="abc -,", min_size=1, max_size=14),
                st.text(alphabet="abc -,", min_size=1, max_size=14),
            ),
            min_size=1,
            max_size=4,
        )
    )
    def test_generation_soundness_property(self, pairs):
        # Every transformation generated from a pair covers that pair —
        # checked indirectly: each pair is covered by ≥1 generated t.
        unique, _ = generate_for_pairs(pairs, CFG)
        for s, g in pairs:
            assert any(t.covers(s, g) for t in unique)
