"""Hypothesis property tests: on arbitrary small streams, every approach
within its Table-9 envelope equals the declarative brute-force oracle, and
structural invariants (semantics containment, monotonicity) hold."""
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.baselines.bruteforce import aggregate_bruteforce, enumerate_trends
from repro.baselines.registry import APPROACHES, run_approach, supports
from repro.core.aggregates import Count, Min, Sum
from repro.core.events import Event
from repro.core.granularity import Semantics
from repro.core.predicates import AdjacentPredicate
from repro.core.query import Query

streams = st.lists(
    st.tuples(st.sampled_from("ABC"), st.integers(0, 4)), min_size=0, max_size=10
).map(
    lambda tl: [Event(i, i + 1, t, {"v": v}) for i, (t, v) in enumerate(tl)]
)
patterns = st.sampled_from(
    ["A+", "SEQ(A+, B)", "(SEQ(A+, B))+", "SEQ(A+, B+)", "(SEQ(A, B))+"]
)
pred_sets = st.sampled_from(
    [
        (),
        (AdjacentPredicate("A", "v", "<", "A", "v"),),
        (AdjacentPredicate("B", "v", ">=", "A", "v"),),
    ]
)
AGGS = (Count(), Min("A", "v"), Sum("B", "v"))


@settings(max_examples=150, deadline=None)
@given(events=streams, pattern=patterns, semantics=st.sampled_from(Semantics),
       preds=pred_sets)
def test_every_approach_matches_oracle(events, pattern, semantics, preds):
    cq = Query(pattern=pattern, semantics=semantics, aggregates=AGGS,
               adjacent_predicates=preds).compile()
    expected = aggregate_bruteforce(events, cq)
    for name in APPROACHES:
        if supports(name, cq):
            assert run_approach(name, events, cq).aggregates == expected, name


@settings(max_examples=100, deadline=None)
@given(events=streams, pattern=patterns, preds=pred_sets)
def test_semantics_containment(events, pattern, preds):
    """Figure 2: trends_cont subset trends_next subset trends_any, hence
    count_cont <= count_next <= count_any."""
    counts = {}
    for sem in Semantics:
        cq = Query(pattern=pattern, semantics=sem, adjacent_predicates=preds
                   ).compile()
        counts[sem] = run_approach("cogra", events, cq).aggregates["count_star"]
    assert counts[Semantics.CONT] <= counts[Semantics.NEXT] <= counts[Semantics.ANY]


@settings(max_examples=80, deadline=None)
@given(events=streams, pattern=patterns)
def test_any_count_monotone_in_prefix(events, pattern):
    """Under ANY (no predicates) appending events never loses trends."""
    cq = Query(pattern=pattern, semantics=Semantics.ANY).compile()
    prev = 0
    for k in range(len(events) + 1):
        cur = run_approach("cogra", events[:k], cq).aggregates["count_star"]
        assert cur >= prev
        prev = cur


@settings(max_examples=80, deadline=None)
@given(events=streams, pattern=patterns, preds=pred_sets,
       semantics=st.sampled_from(Semantics))
def test_trend_structure_valid(events, pattern, semantics, preds):
    """Every materialized trend is FSA-accepted, time-ordered, and
    predicate-consistent — the oracle's own output is well-formed."""
    from repro.core.predicates import adjacency_holds

    cq = Query(pattern=pattern, semantics=semantics,
               adjacent_predicates=preds).compile()
    for tr in enumerate_trends(events, cq):
        assert cq.analysis.accepts([e.etype for e in tr])
        for a, b in zip(tr, tr[1:]):
            assert a.time < b.time
            assert adjacency_holds(preds, a.etype, a.attrs, b.etype, b.attrs)
