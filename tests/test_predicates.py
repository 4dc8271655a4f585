"""Predicate model and classifier (paper Sections 3.2, 7; Theorem 5.1)."""
import pytest

from repro.core.fsa import analyze
from repro.core.pattern import parse_pattern
from repro.core.predicates import (
    AdjacentPredicate,
    LocalPredicate,
    adjacency_holds,
    classify_event_grained_types,
)


class TestLocalPredicate:
    def test_targeted_type_filters(self):
        lp = LocalPredicate("activity", "==", 3, etype="M")
        assert lp.holds("M", {"activity": 3})
        assert not lp.holds("M", {"activity": 4})

    def test_other_types_pass(self):
        lp = LocalPredicate("activity", "==", 3, etype="M")
        assert lp.holds("X", {"activity": 4})

    def test_untargeted_applies_to_all(self):
        lp = LocalPredicate("v", "<", 5)
        assert lp.holds("A", {"v": 4})
        assert not lp.holds("B", {"v": 6})

    @pytest.mark.parametrize(
        "op, a, b, res",
        [("<", 1, 2, True), ("<=", 2, 2, True), (">", 1, 2, False),
         (">=", 2, 2, True), ("==", 2, 2, True), ("!=", 2, 2, False)],
    )
    def test_operators(self, op, a, b, res):
        assert LocalPredicate("v", op, b).holds("A", {"v": a}) is res

    def test_unknown_operator(self):
        with pytest.raises(ValueError):
            LocalPredicate("v", "~", 1)


class TestAdjacentPredicate:
    def test_applies_to_type_pair_only(self):
        p = AdjacentPredicate("A", "v", "<", "B", "v")
        assert p.applies("A", "B")
        assert not p.applies("B", "A")
        assert not p.applies("A", "A")

    def test_holds_with_offset(self):
        p = AdjacentPredicate("A", "v", "<", "A", "v", offset=0.5)
        assert p.holds({"v": 1.0}, {"v": 0.6})  # 1.0 < 0.6 + 0.5
        assert not p.holds({"v": 1.2}, {"v": 0.6})

    def test_unknown_operator(self):
        with pytest.raises(ValueError):
            AdjacentPredicate("A", "v", "~", "B", "v")

    def test_adjacency_holds_unrestricted_pair(self):
        preds = (AdjacentPredicate("A", "v", "<", "A", "v"),)
        # (B, A) pair has no applicable predicate: unrestricted.
        assert adjacency_holds(preds, "B", {"v": 9}, "A", {"v": 0})

    def test_adjacency_holds_all_applicable(self):
        preds = (
            AdjacentPredicate("A", "v", "<", "B", "v"),
            AdjacentPredicate("A", "w", "!=", "B", "w"),
        )
        assert adjacency_holds(preds, "A", {"v": 1, "w": 5}, "B", {"v": 2, "w": 6})
        assert not adjacency_holds(preds, "A", {"v": 1, "w": 5}, "B", {"v": 2, "w": 5})


class TestClassifier:
    """Theorem 5.1: E is event-grained iff a predicate (E.attr op Ex.attr)
    exists with E in predTypes(Ex)."""

    def an(self, text):
        return analyze(parse_pattern(text))

    def test_running_example_b_event_grained(self):
        # Example 6: theta restricts adjacency between b's and a's.
        a = self.an("(SEQ(A+, B))+")
        preds = (AdjacentPredicate("B", "v", "==", "A", "v"),)
        assert classify_event_grained_types(a, preds) == frozenset({"B"})

    def test_self_loop_restriction(self):
        a = self.an("SEQ(D+, U)")
        preds = (AdjacentPredicate("D", "price", "<", "D", "price"),)
        assert classify_event_grained_types(a, preds) == frozenset({"D"})

    def test_no_predicates(self):
        a = self.an("(SEQ(A+, B))+")
        assert classify_event_grained_types(a, ()) == frozenset()

    def test_predicate_on_nonexistent_transition_ignored(self):
        # SEQ(A, B): B is not a predecessor of A, so a (B, A) predicate
        # restricts nothing.
        a = self.an("SEQ(A, B)")
        preds = (AdjacentPredicate("B", "v", "<", "A", "v"),)
        assert classify_event_grained_types(a, preds) == frozenset()

    def test_multiple_predicates(self):
        a = self.an("(SEQ(A+, B))+")
        preds = (
            AdjacentPredicate("B", "v", "==", "A", "v"),
            AdjacentPredicate("A", "v", "<", "B", "v"),
        )
        assert classify_event_grained_types(a, preds) == frozenset({"A", "B"})

    def test_foreign_type_not_included(self):
        a = self.an("SEQ(A, B)")
        preds = (AdjacentPredicate("Z", "v", "<", "B", "v"),)
        assert classify_event_grained_types(a, preds) == frozenset()
