"""Placeholder detection and maximal segmentation (paper §4.1, Def. 4)."""
from hypothesis import given, strategies as st

from repro.core.placeholders import (
    Segment,
    all_placeholders,
    longest_match_at,
    match_spans,
    maximal_segmentation,
    tokenize_placeholder,
)


class TestMatchSpans:
    def test_single_occurrence(self):
        assert match_spans("bowling, michael", "michael") == [(9, 16)]

    def test_multiple_occurrences(self):
        assert match_spans("abcabc", "abc") == [(0, 3), (3, 6)]

    def test_overlapping_occurrences(self):
        assert match_spans("aaaa", "aa") == [(0, 2), (1, 3), (2, 4)]

    def test_no_occurrence(self):
        assert match_spans("abc", "x") == []

    def test_empty_needle(self):
        assert match_spans("abc", "") == []

    @given(st.text(alphabet="ab", max_size=12), st.text(alphabet="ab", min_size=1, max_size=4))
    def test_spans_are_correct(self, hay, needle):
        for s, e in match_spans(hay, needle):
            assert hay[s:e] == needle


class TestLongestMatchAt:
    def test_prefix(self):
        # longest prefix of "michael.b" found in "bowling, michael"
        assert longest_match_at("bowling, michael", "michael.bowling", 0) == 7

    def test_no_match(self):
        assert longest_match_at("abc", "xyz", 0) == 0

    def test_full_target(self):
        assert longest_match_at("hello world", "hello", 0) == 5

    def test_mid_position(self):
        assert longest_match_at("abcdef", "xxcdef", 2) == 4


class TestMaximalSegmentation:
    def test_paper_victor_example(self):
        # §4.1.3: ("Victor Robbie Kasumba", "Victor R. Kasumba")
        segs = maximal_segmentation("Victor Robbie Kasumba", "Victor R. Kasumba")
        assert [(s.is_placeholder, s.text) for s in segs] == [
            (True, "Victor R"),
            (False, ". "),
            (True, "Kasumba"),
        ]

    def test_email_example(self):
        # §4.1 Figure 2: "bowling, michael" → "michael.bowling@ualberta.ca"
        segs = maximal_segmentation("bowling, michael", "michael.bowling@ualberta.ca")
        kinds = [(s.is_placeholder, s.text) for s in segs]
        assert (True, "michael") in kinds
        assert (True, "bowling") in kinds
        # "@" never occurs in the source → it must land in a literal
        assert any(not p and "@" in t for p, t in kinds)

    def test_concatenation_reproduces_target(self):
        src, tgt = "Victor Robbie Kasumba", "Victor R. Kasumba"
        segs = maximal_segmentation(src, tgt)
        assert "".join(s.text for s in segs) == tgt

    def test_offsets_are_consistent(self):
        src, tgt = "bowling, michael", "michael.bowling@ualberta.ca"
        for s in maximal_segmentation(src, tgt):
            assert tgt[s.tgt_start : s.tgt_start + len(s.text)] == s.text

    def test_all_literal_when_nothing_shared(self):
        segs = maximal_segmentation("abc", "xyz")
        assert len(segs) == 1 and not segs[0].is_placeholder and segs[0].text == "xyz"

    def test_all_placeholder_when_target_in_source(self):
        segs = maximal_segmentation("hello world", "world")
        assert len(segs) == 1 and segs[0].is_placeholder

    def test_empty_target(self):
        assert maximal_segmentation("abc", "") == []

    def test_greedy_takes_longest(self):
        # "ab" and "abc" both occur; greedy must take "abc".
        segs = maximal_segmentation("xxabcxx", "abcZ")
        assert segs[0].text == "abc" and segs[0].is_placeholder

    @given(
        st.text(alphabet="abc ", min_size=1, max_size=15),
        st.text(alphabet="abc ", min_size=1, max_size=15),
    )
    def test_segmentation_always_reproduces_target(self, src, tgt):
        segs = maximal_segmentation(src, tgt)
        assert "".join(s.text for s in segs) == tgt
        for seg in segs:
            if seg.is_placeholder:
                assert seg.text in src


class TestTokenizePlaceholder:
    def test_splits_at_space(self):
        seg = Segment(True, "Victor R", 0)
        parts = tokenize_placeholder(seg)
        assert [(p.is_placeholder, p.text) for p in parts] == [
            (True, "Victor"),
            (False, " "),
            (True, "R"),
        ]

    def test_no_separator_is_identity(self):
        seg = Segment(True, "Kasumba", 10)
        assert tokenize_placeholder(seg) == [seg]

    def test_multiple_separators(self):
        seg = Segment(True, "a-b c", 0)
        parts = tokenize_placeholder(seg)
        assert [p.text for p in parts] == ["a", "-", "b", " ", "c"]
        assert [p.is_placeholder for p in parts] == [True, False, True, False, True]

    def test_separator_run_stays_single_literal(self):
        seg = Segment(True, "a, b", 0)
        parts = tokenize_placeholder(seg)
        assert [p.text for p in parts] == ["a", ", ", "b"]

    def test_offsets_preserved(self):
        seg = Segment(True, "ab cd", 7)
        parts = tokenize_placeholder(seg)
        assert [p.tgt_start for p in parts] == [7, 9, 10]


class TestAllPlaceholders:
    def test_maximal_only(self):
        got = all_placeholders("Victor Robbie Kasumba", "Victor R. Kasumba")
        assert got == ["Victor R", "Kasumba"]

    def test_full_set_includes_substrings(self):
        got = all_placeholders("abcd", "abc", maximal_only=False)
        # every substring of the target that occurs in the source
        assert set(got) == {"a", "b", "c", "ab", "bc", "abc"}

    def test_full_set_excludes_non_common(self):
        got = all_placeholders("abc", "abz", maximal_only=False)
        assert "abz" not in got and "z" not in got
