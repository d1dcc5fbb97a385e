"""Transformation-unit algebra (paper §2).

A *transformation unit* copies part of its input (or a constant literal)
to the output. A *transformation* is a sequence of units; applying it to
a string concatenates the unit outputs. Units are immutable, hashable
value objects so transformations can be deduplicated in hash sets
(paper §4.1.5) and broadcast to Spark executors.

Pinned semantics (DESIGN.md §5): 0-based indices, end-exclusive
substrings, ``str.split``-style splitting, and ``None`` for a unit that
does not apply to an input (out-of-range index, invalid span). A
transformation whose any unit returns ``None`` does not apply.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Optional, Tuple, Union


@dataclass(frozen=True)
class Substr:
    """Return ``input[s:e]`` (0-based, end-exclusive)."""

    s: int
    e: int

    def apply(self, text: str) -> Optional[str]:
        if self.s < 0 or self.e > len(text) or self.s >= self.e:
            return None
        return text[self.s : self.e]

    def __str__(self) -> str:
        return f"Substr({self.s},{self.e})"


@dataclass(frozen=True)
class Split:
    """Split the input on ``c`` and return the ``i``-th piece (0-based)."""

    c: str
    i: int

    def apply(self, text: str) -> Optional[str]:
        pieces = text.split(self.c)
        if self.i < 0 or self.i >= len(pieces):
            return None
        return pieces[self.i]

    def __str__(self) -> str:
        return f"Split({self.c!r},{self.i})"


@dataclass(frozen=True)
class SplitSubstr:
    """``Split(c, i)`` followed by ``Substr(s, e)`` on the piece."""

    c: str
    i: int
    s: int
    e: int

    def apply(self, text: str) -> Optional[str]:
        pieces = text.split(self.c)
        if self.i < 0 or self.i >= len(pieces):
            return None
        return Substr(self.s, self.e).apply(pieces[self.i])

    def __str__(self) -> str:
        return f"SplitSubstr({self.c!r},{self.i},{self.s},{self.e})"


@dataclass(frozen=True)
class TwoCharSplitSubstr:
    """Split on either of two delimiters, then ``Substr`` on piece ``i``.

    Implemented for completeness (Lemma 1); excluded from experiment
    configurations, matching the paper's §6.2 setup.
    """

    c1: str
    c2: str
    i: int
    s: int
    e: int

    def apply(self, text: str) -> Optional[str]:
        pieces = text.replace(self.c2, self.c1).split(self.c1)
        if self.i < 0 or self.i >= len(pieces):
            return None
        # Piece boundaries are identical in the original text because the
        # delimiter substitution is 1-char-for-1-char; recover the piece
        # from the original so its characters are untouched.
        start = 0
        for k in range(self.i):
            start += len(pieces[k]) + 1
        piece = text[start : start + len(pieces[self.i])]
        return Substr(self.s, self.e).apply(piece)

    def __str__(self) -> str:
        return f"TwoCharSplitSubstr({self.c1!r},{self.c2!r},{self.i},{self.s},{self.e})"


@dataclass(frozen=True)
class Literal:
    """Return the constant ``text`` irrespective of the input."""

    text: str

    def apply(self, text: str) -> Optional[str]:
        return self.text

    def __str__(self) -> str:
        return f"Literal({self.text!r})"


Unit = Union[Substr, Split, SplitSubstr, TwoCharSplitSubstr, Literal]

#: Units whose output depends on the input — the basis for placeholders
#: (Definition 4 uses the set of *non-constant* units).
NONCONSTANT_UNITS = (Substr, Split, SplitSubstr, TwoCharSplitSubstr)


@dataclass(frozen=True)
class Transformation:
    """A sequence of units; ``apply`` concatenates their outputs (Def. 2)."""

    units: Tuple[Unit, ...]

    def apply(self, text: str) -> Optional[str]:
        out = []
        for u in self.units:
            piece = u.apply(text)
            if piece is None:
                return None
            out.append(piece)
        return "".join(out)

    def covers(self, src: str, tgt: str) -> bool:
        """True iff this transformation maps ``src`` exactly onto ``tgt``."""
        return self.apply(src) == tgt

    @property
    def n_placeholders(self) -> int:
        """Number of non-constant units — the length measure of §4.1.2."""
        return sum(1 for u in self.units if not isinstance(u, Literal))

    def is_pure_literal(self) -> bool:
        return all(isinstance(u, Literal) for u in self.units)

    def __str__(self) -> str:
        return "<" + ", ".join(str(u) for u in self.units) + ">"

    def serialize(self) -> str:
        """Stable string form for DataFrame dedup / broadcast."""
        return repr(self.units)


def transformation(*units: Unit) -> Transformation:
    """Convenience constructor: ``transformation(Substr(0,3), Literal('x'))``."""
    return Transformation(tuple(units))


# ---------------------------------------------------------------------------
# Serialization: transformations cross the Spark boundary as strings.
# ---------------------------------------------------------------------------

_UNIT_TYPES = {
    "Substr": Substr,
    "Split": Split,
    "SplitSubstr": SplitSubstr,
    "TwoCharSplitSubstr": TwoCharSplitSubstr,
    "Literal": Literal,
}


def deserialize(text: str) -> Transformation:
    """Inverse of :meth:`Transformation.serialize`.

    The serialized form is the ``repr`` of a tuple of frozen dataclasses,
    evaluated in a namespace restricted to the unit types — no arbitrary
    code can execute.
    """
    return Transformation(eval(text, {"__builtins__": {}}, _UNIT_TYPES))
