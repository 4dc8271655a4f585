"""Granularity Selector (paper Section 3.3, Table 4).

Given the event matching semantics and the presence of predicates on
adjacent events, select the coarsest granularity at which trend aggregates
can be maintained while guaranteeing correctness and optimal time
complexity:

=====================  =========================  ============
semantics              adjacent predicates        granularity
=====================  =========================  ============
ANY                    without                    TYPE
ANY                    with                       MIXED
NEXT, CONT             (either)                   PATTERN
=====================  =========================  ============
"""
from __future__ import annotations

import enum

from repro.core.fsa import PatternAnalysis
from repro.core.predicates import AdjacentPredicate, classify_event_grained_types


class Granularity(enum.Enum):
    TYPE = "type"
    MIXED = "mixed"
    PATTERN = "pattern"


class Semantics(enum.Enum):
    """Event matching semantics (paper Section 2.2)."""

    ANY = "skip-till-any-match"
    NEXT = "skip-till-next-match"
    CONT = "contiguous"


def select_granularity(
    semantics: Semantics,
    analysis: PatternAnalysis,
    adjacent_predicates: tuple[AdjacentPredicate, ...],
) -> Granularity:
    """Table-4 selection.

    A predicate only forces event-grained bookkeeping if it actually
    restricts an adjacency pair of the pattern (Theorem 5.1); an ANY query
    whose adjacent predicates touch no pattern transition is safely run at
    the pure type granularity.
    """
    if semantics in (Semantics.NEXT, Semantics.CONT):
        return Granularity.PATTERN
    if classify_event_grained_types(analysis, adjacent_predicates):
        return Granularity.MIXED
    return Granularity.TYPE
