"""Unit semantics of the transformation algebra (paper §2)."""
import pytest
from hypothesis import given, strategies as st

from repro.core.units import (
    Literal,
    Split,
    SplitSubstr,
    Substr,
    Transformation,
    TwoCharSplitSubstr,
    deserialize,
    transformation,
)


class TestSubstr:
    def test_basic(self):
        assert Substr(0, 3).apply("abcdef") == "abc"

    def test_middle(self):
        assert Substr(2, 5).apply("abcdef") == "cde"

    def test_full(self):
        assert Substr(0, 6).apply("abcdef") == "abcdef"

    def test_single_char(self):
        assert Substr(3, 4).apply("abcdef") == "d"

    def test_end_past_length_is_invalid(self):
        assert Substr(0, 7).apply("abcdef") is None

    def test_empty_span_is_invalid(self):
        assert Substr(3, 3).apply("abcdef") is None

    def test_inverted_span_is_invalid(self):
        assert Substr(4, 2).apply("abcdef") is None

    def test_negative_start_is_invalid(self):
        assert Substr(-1, 3).apply("abcdef") is None

    def test_empty_input(self):
        assert Substr(0, 1).apply("") is None


class TestSplit:
    def test_first_piece(self):
        assert Split(",", 0).apply("a,b,c") == "a"

    def test_middle_piece(self):
        assert Split(",", 1).apply("a,b,c") == "b"

    def test_last_piece(self):
        assert Split(",", 2).apply("a,b,c") == "c"

    def test_out_of_range(self):
        assert Split(",", 3).apply("a,b,c") is None

    def test_negative_index(self):
        assert Split(",", -1).apply("a,b,c") is None

    def test_delimiter_absent_returns_whole_input(self):
        # Lemma 1 case (1): no delimiter → split degenerates to identity.
        assert Split("#", 0).apply("a,b,c") == "a,b,c"

    def test_adjacent_delimiters_give_empty_piece(self):
        assert Split(",", 1).apply("a,,c") == ""

    def test_leading_delimiter(self):
        assert Split(",", 0).apply(",abc") == ""

    def test_paper_example_fig1(self):
        # §3.2: Split(',', 1) on "prus-czarnecki, andrzej" → " andrzej"
        assert Split(",", 1).apply("prus-czarnecki, andrzej") == " andrzej"


class TestSplitSubstr:
    def test_equivalent_to_split_then_substr(self):
        text = "alpha beta gamma"
        for i in range(3):
            piece = text.split(" ")[i]
            for s in range(len(piece)):
                for e in range(s + 1, len(piece) + 1):
                    assert SplitSubstr(" ", i, s, e).apply(text) == piece[s:e]

    def test_paper_fig1_initial(self):
        # §3.2: SplitSubstr(' ', 2, 0, 1) maps "prus-czarnecki, andrzej"
        # (split on space: ['prus-czarnecki,', '', ...]) — the paper's
        # worked example uses 1-based piece index 2; with our 0-based
        # semantics piece 1 of "bowling, michael" is "michael".
        assert SplitSubstr(" ", 1, 0, 1).apply("bowling, michael") == "m"

    def test_invalid_piece(self):
        assert SplitSubstr(" ", 5, 0, 1).apply("a b") is None

    def test_invalid_span(self):
        assert SplitSubstr(" ", 0, 0, 9).apply("abc def") is None


class TestTwoCharSplitSubstr:
    def test_splits_on_both_chars(self):
        assert TwoCharSplitSubstr(",", ";", 1, 0, 1).apply("a,b;c") == "b"

    def test_piece_between_delimiters(self):
        assert TwoCharSplitSubstr("-", "/", 2, 0, 3).apply("ab-cde/fgh-ij") == "fgh"

    def test_preserves_original_characters(self):
        # The c2→c1 substitution must not leak into the output piece.
        assert TwoCharSplitSubstr("x", "y", 1, 0, 2).apply("axbdycz") == "bd"

    def test_invalid_index(self):
        assert TwoCharSplitSubstr(",", ";", 9, 0, 1).apply("a,b;c") is None


class TestLiteral:
    def test_constant(self):
        assert Literal("xyz").apply("anything") == "xyz"

    def test_empty_literal(self):
        assert Literal("").apply("abc") == ""


class TestTransformation:
    def test_concatenation(self):
        t = transformation(Substr(0, 3), Literal("-"), Substr(3, 6))
        assert t.apply("abcdef") == "abc-def"

    def test_any_failing_unit_fails_whole(self):
        t = transformation(Substr(0, 3), Substr(0, 99))
        assert t.apply("abcdef") is None

    def test_covers(self):
        t = transformation(Split(",", 1), Literal("!"))
        assert t.covers("a,b", "b!")
        assert not t.covers("a,b", "b")

    def test_paper_fig1_transformation(self):
        # §3.2's final result (1-based there; 0-based here):
        # <SplitSubstr(' ',2,0,1), Literal(' '), Split(',',1)> maps
        # "bowling, michael" → "m bowling" ... our Split(',',0) is piece 1.
        t = transformation(SplitSubstr(" ", 1, 0, 1), Literal(" "), Split(",", 0))
        assert t.apply("bowling, michael") == "m bowling"
        assert t.apply("gosgnach, simon") == "s gosgnach"
        assert t.apply("prus-czarnecki, andrzej") == "a prus-czarnecki"

    def test_n_placeholders(self):
        t = transformation(Substr(0, 1), Literal("."), Split(",", 0))
        assert t.n_placeholders == 2

    def test_pure_literal(self):
        assert transformation(Literal("a"), Literal("b")).is_pure_literal()
        assert not transformation(Literal("a"), Substr(0, 1)).is_pure_literal()

    def test_hashable_and_eq(self):
        a = transformation(Substr(0, 2), Literal("x"))
        b = transformation(Substr(0, 2), Literal("x"))
        c = transformation(Substr(0, 3), Literal("x"))
        assert a == b and hash(a) == hash(b)
        assert a != c
        assert len({a, b, c}) == 2

    def test_str_form(self):
        t = transformation(Substr(0, 2), Literal("x"))
        assert str(t) == "<Substr(0,2), Literal('x')>"


class TestLemmaExamples:
    """The Lemma 2/3 worked examples from §4.1.2."""

    PAIRS = [("abcdefghijklmn", "defg.jkb"), ("0123456789abcd", "d456.9ab")]

    def test_t1_covers_first_row_only(self):
        t1 = transformation(Substr(3, 7), Literal("."), Substr(9, 11), Literal("b"))
        # paper's t1 (1-based: Substr(4,7)..) covers row 1
        assert t1.apply(self.PAIRS[0][0]) == "defg.jkb"
        assert t1.apply(self.PAIRS[1][0]) != self.PAIRS[1][1]

    def test_t3_covers_both_rows(self):
        t3 = transformation(
            Literal("d"), Substr(4, 7), Literal("."), Substr(9, 11), Literal("b")
        )
        # non-maximal placeholders can cover both rows (Lemma 3)
        assert t3.apply(self.PAIRS[0][0]) == self.PAIRS[0][1]
        assert t3.apply(self.PAIRS[1][0]) == self.PAIRS[1][1]


class TestSerialization:
    @pytest.mark.parametrize(
        "t",
        [
            transformation(Substr(0, 3)),
            transformation(Split(",", 1), Literal(" & ")),
            transformation(SplitSubstr(" ", 1, 0, 1), Literal("'"), Substr(2, 9)),
            transformation(TwoCharSplitSubstr("-", "/", 2, 0, 3)),
            transformation(Literal("only constant")),
        ],
    )
    def test_roundtrip(self, t):
        assert deserialize(t.serialize()) == t

    def test_roundtrip_special_chars(self):
        t = transformation(Split("\\", 0), Literal("it's \"quoted\""))
        assert deserialize(t.serialize()) == t

    @given(st.text(min_size=0, max_size=10))
    def test_literal_roundtrip_any_text(self, text):
        t = transformation(Literal(text))
        assert deserialize(t.serialize()) == t


@given(
    st.text(alphabet=st.characters(codec="ascii", exclude_characters="\x00"), min_size=1, max_size=30),
    st.integers(0, 30),
    st.integers(0, 30),
)
def test_substr_never_crashes(text, s, e):
    out = Substr(s, e).apply(text)
    if out is not None:
        assert out == text[s:e] and len(out) == e - s


@given(
    st.text(alphabet="ab,x", min_size=1, max_size=20),
    st.integers(0, 5),
)
def test_split_matches_python_semantics(text, i):
    out = Split(",", i).apply(text)
    pieces = text.split(",")
    assert out == (pieces[i] if i < len(pieces) else None)
