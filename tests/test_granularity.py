"""Granularity Selector — paper Table 4 (Section 3.3)."""
import pytest

from repro.core.fsa import analyze
from repro.core.granularity import Granularity, Semantics, select_granularity
from repro.core.pattern import parse_pattern
from repro.core.predicates import AdjacentPredicate
from repro.core.query import Query

AN = analyze(parse_pattern("(SEQ(A+, B))+"))
RESTRICTING = (AdjacentPredicate("A", "v", "<", "A", "v"),)


@pytest.mark.parametrize(
    "semantics, preds, expected",
    [
        # Table 4 rows:
        (Semantics.ANY, (), Granularity.TYPE),
        (Semantics.ANY, RESTRICTING, Granularity.MIXED),
        (Semantics.NEXT, (), Granularity.PATTERN),
        (Semantics.NEXT, RESTRICTING, Granularity.PATTERN),
        (Semantics.CONT, (), Granularity.PATTERN),
        (Semantics.CONT, RESTRICTING, Granularity.PATTERN),
    ],
)
def test_table4(semantics, preds, expected):
    assert select_granularity(semantics, AN, preds) is expected


def test_any_with_irrelevant_predicate_stays_type_grained():
    """A predicate that restricts no pattern transition forces nothing."""
    an = analyze(parse_pattern("SEQ(A, B)"))
    preds = (AdjacentPredicate("B", "v", "<", "A", "v"),)  # B->A not a transition
    assert select_granularity(Semantics.ANY, an, preds) is Granularity.TYPE


@pytest.mark.parametrize(
    "semantics, preds, expected_te",
    [
        (Semantics.ANY, (AdjacentPredicate("B", "v", "==", "A", "v"),), {"B"}),
        (Semantics.ANY, (), set()),
    ],
)
def test_compiled_query_type_split(semantics, preds, expected_te):
    cq = Query(
        pattern="(SEQ(A+, B))+", semantics=semantics, adjacent_predicates=preds
    ).compile()
    assert cq.event_grained_types == frozenset(expected_te)
    assert cq.type_grained_types == frozenset({"A", "B"}) - expected_te


def test_compiled_query_granularity_matches_selector():
    for sem in Semantics:
        for preds in ((), RESTRICTING):
            cq = Query(
                pattern="(SEQ(A+, B))+", semantics=sem, adjacent_predicates=preds
            ).compile()
            assert cq.granularity is select_granularity(sem, AN, preds)
