"""Kleene pattern AST and parser (paper Definition 1).

A pattern is ``E`` (an event type), ``P+`` (Kleene plus), or
``SEQ(P1, ..., Pk)`` (event sequence, k >= 2; n-ary SEQ is kept as-is and
treated as the left-fold of binary SEQ). Negation, Kleene star, optional
sub-patterns, conjunction and disjunction are outside the paper's core
query class (Section 2.1); Section 8 reduces star/optional to Kleene plus
plus disjunction, so supporting plus is the essential case.

Each event type may appear at most once in a pattern (paper assumption;
Section 8's renaming extension is out of scope here and enforced by
``validate``).
"""
from __future__ import annotations

from dataclasses import dataclass, field


class Pattern:
    """Base class for pattern AST nodes."""

    def types(self) -> list[str]:
        """All event types in the pattern, in syntactic order."""
        raise NotImplementedError

    @property
    def length(self) -> int:
        """Pattern length = number of event types in it (Definition 1)."""
        return len(self.types())

    def is_kleene(self) -> bool:
        """True iff the pattern contains a Kleene plus operator."""
        raise NotImplementedError


@dataclass(frozen=True)
class TypeP(Pattern):
    """A single event type, e.g. ``A``."""

    name: str

    def types(self) -> list[str]:
        return [self.name]

    def is_kleene(self) -> bool:
        return False

    def __str__(self) -> str:
        return self.name


@dataclass(frozen=True)
class Plus(Pattern):
    """Kleene plus ``P+``: one or more matches of ``P`` in sequence."""

    sub: Pattern

    def types(self) -> list[str]:
        return self.sub.types()

    def is_kleene(self) -> bool:
        return True

    def __str__(self) -> str:
        s = str(self.sub)
        if isinstance(self.sub, TypeP):
            return f"{s}+"
        return f"({s})+"


@dataclass(frozen=True)
class Seq(Pattern):
    """Event sequence ``SEQ(P1, ..., Pk)``, k >= 2."""

    subs: tuple[Pattern, ...] = field(default_factory=tuple)

    def __post_init__(self) -> None:
        if len(self.subs) < 2:
            raise ValueError("SEQ needs at least two sub-patterns")

    def types(self) -> list[str]:
        out: list[str] = []
        for s in self.subs:
            out.extend(s.types())
        return out

    def is_kleene(self) -> bool:
        return any(s.is_kleene() for s in self.subs)

    def __str__(self) -> str:
        return "SEQ(" + ", ".join(str(s) for s in self.subs) + ")"


def validate(p: Pattern) -> Pattern:
    """Enforce the paper's assumption that a type occurs at most once."""
    ts = p.types()
    if len(ts) != len(set(ts)):
        dup = sorted({t for t in ts if ts.count(t) > 1})
        raise ValueError(f"event type(s) occur more than once in pattern: {dup}")
    return p


class _Parser:
    """Recursive-descent parser for the textual pattern syntax.

    Grammar::

        pattern := primary '+'?
        primary := IDENT | 'SEQ' '(' pattern (',' pattern)+ ')' | '(' pattern ')'

    IDENT is ``[A-Za-z_][A-Za-z0-9_]*``. ``SEQ`` is case-insensitive.
    """

    def __init__(self, text: str) -> None:
        self.text = text
        self.pos = 0

    def _skip_ws(self) -> None:
        while self.pos < len(self.text) and self.text[self.pos].isspace():
            self.pos += 1

    def _peek(self) -> str:
        self._skip_ws()
        return self.text[self.pos] if self.pos < len(self.text) else ""

    def _expect(self, ch: str) -> None:
        if self._peek() != ch:
            raise ValueError(
                f"expected {ch!r} at position {self.pos} in {self.text!r}"
            )
        self.pos += 1

    def _ident(self) -> str:
        self._skip_ws()
        start = self.pos
        while self.pos < len(self.text) and (
            self.text[self.pos].isalnum() or self.text[self.pos] == "_"
        ):
            self.pos += 1
        if self.pos == start:
            raise ValueError(
                f"expected identifier at position {start} in {self.text!r}"
            )
        return self.text[start : self.pos]

    def parse(self) -> Pattern:
        p = self._pattern()
        self._skip_ws()
        if self.pos != len(self.text):
            raise ValueError(
                f"trailing input at position {self.pos} in {self.text!r}"
            )
        return p

    def _pattern(self) -> Pattern:
        p = self._primary()
        if self._peek() == "+":
            self.pos += 1
            p = Plus(p)
        return p

    def _primary(self) -> Pattern:
        if self._peek() == "(":
            self.pos += 1
            p = self._pattern()
            self._expect(")")
            return p
        name = self._ident()
        if name.upper() == "SEQ" and self._peek() == "(":
            self.pos += 1
            subs = [self._pattern()]
            while self._peek() == ",":
                self.pos += 1
                subs.append(self._pattern())
            self._expect(")")
            return Seq(tuple(subs))
        return TypeP(name)


def parse_pattern(text: str) -> Pattern:
    """Parse a pattern string, e.g. ``"(SEQ(A+, B))+"`` or ``"M+"``.

    Raises ``ValueError`` on syntax errors or repeated event types.
    """
    return validate(_Parser(text).parse())
