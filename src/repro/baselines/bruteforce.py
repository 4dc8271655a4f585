"""Declarative brute-force oracle: materialize every event trend from the
semantics definitions (paper Section 2.2), aggregate trend-by-trend.

This is the ground truth all aggregators and baselines are tested against:

* **ANY** — full enumeration per Definition 2: a trend is a subsequence
  whose type string is accepted by the pattern's FSA digraph (a local
  language: starts at start(P), ends at end(P), every bigram is an allowed
  transition) and whose consecutive pairs satisfy the adjacent predicates.
  Exponential; guarded by a trend cap for tests.
* **NEXT / CONT** — an independent *trend-materializing* implementation of
  the operational semantics (DESIGN.md Section 2): all partial trends form
  a suffix-nested family ending at the last matched event; a matched event
  extends all of them (originals dropped), starts a new trend if of start
  type, and emits finished trends when of end type; unmatched events are
  skipped under NEXT and invalidate all partials under CONT. This shares
  no state-compression with Algorithm 3, so it is a meaningful cross-check
  of counts and of MIN/MAX/SUM/AVG, which it computes per materialized
  trend.
"""
from __future__ import annotations

from repro.core.aggregates import AggSpec, Avg, Count, CountType, Max, Min, Sum
from repro.core.events import Event
from repro.core.granularity import Semantics
from repro.core.predicates import adjacency_holds
from repro.core.query import CompiledQuery


class TrendExplosion(RuntimeError):
    """Raised when brute-force enumeration exceeds the configured cap."""


def enumerate_trends_any(
    events: list[Event], cq: CompiledQuery, *, max_trends: int = 2_000_000
) -> list[tuple[Event, ...]]:
    """All finished trends under skip-till-any-match (Definition 2)."""
    an = cq.analysis
    preds = cq.adjacent_predicates
    relevant = [e for e in events if e.etype in an.pred_types]
    out: list[tuple[Event, ...]] = []

    def extend(prefix: list[Event]) -> None:
        last = prefix[-1]
        if last.etype == an.end:
            out.append(tuple(prefix))
            if len(out) > max_trends:
                raise TrendExplosion(f"more than {max_trends} trends")
        for e in relevant:
            if e.time <= last.time:
                continue  # Definition 7 requires strictly increasing time
            if last.etype not in an.pred_types[e.etype]:
                continue
            if not adjacency_holds(preds, last.etype, last.attrs, e.etype, e.attrs):
                continue
            prefix.append(e)
            extend(prefix)
            prefix.pop()

    for e in relevant:
        if e.etype == an.start:
            extend([e])
    return out


def enumerate_trends_next_cont(
    events: list[Event], cq: CompiledQuery
) -> list[tuple[Event, ...]]:
    """All finished trends under NEXT or CONT (operational semantics)."""
    an = cq.analysis
    preds = cq.adjacent_predicates
    cont = cq.semantics is Semantics.CONT
    partials: list[list[Event]] = []
    last: Event | None = None
    out: list[tuple[Event, ...]] = []
    for e in events:
        if e.etype not in an.pred_types:
            if cont:
                partials, last = [], None
            continue
        adjacent = (
            last is not None
            and last.etype in an.pred_types[e.etype]
            and last.time < e.time
            and adjacency_holds(preds, last.etype, last.attrs, e.etype, e.attrs)
        )
        started = e.etype == an.start
        if started or adjacent:
            new_partials = [p + [e] for p in partials] if adjacent else []
            if started:
                new_partials.append([e])
            if e.etype == an.end:
                out.extend(tuple(p) for p in new_partials)
            partials, last = new_partials, e
        elif cont:
            partials, last = [], None
    return out


def enumerate_trends(
    events: list[Event], cq: CompiledQuery, *, max_trends: int = 2_000_000
) -> list[tuple[Event, ...]]:
    if cq.semantics is Semantics.ANY:
        return enumerate_trends_any(events, cq, max_trends=max_trends)
    return enumerate_trends_next_cont(events, cq)


def _trend_value(spec: AggSpec, trend: tuple[Event, ...]):
    """tr.COUNT(E) / tr.MIN / tr.MAX / tr.SUM for one trend (Section 2.3)."""
    if isinstance(spec, CountType):
        return sum(1 for e in trend if e.etype == spec.etype)
    vals = [e.attrs[spec.attr] for e in trend if e.etype == spec.etype]
    if isinstance(spec, Min):
        return min(vals) if vals else None
    if isinstance(spec, Max):
        return max(vals) if vals else None
    if isinstance(spec, Sum):
        return sum(vals)
    if isinstance(spec, Avg):
        return (sum(vals), len(vals))
    raise TypeError(spec)


def aggregate_bruteforce(
    events: list[Event], cq: CompiledQuery, *, max_trends: int = 2_000_000
) -> dict:
    """Per-group aggregates computed trend-by-trend over all finished
    trends; output keys match the incremental kernels'."""
    trends = enumerate_trends(events, cq, max_trends=max_trends)
    out: dict = {}
    for spec in cq.specs:
        if isinstance(spec, Count):
            out[spec.name] = len(trends)
        elif isinstance(spec, (CountType, Sum)):
            out[spec.name] = sum(_trend_value(spec, t) for t in trends)
        elif isinstance(spec, Min):
            vals = [v for t in trends if (v := _trend_value(spec, t)) is not None]
            out[spec.name] = min(vals) if vals else None
        elif isinstance(spec, Max):
            vals = [v for t in trends if (v := _trend_value(spec, t)) is not None]
            out[spec.name] = max(vals) if vals else None
        elif isinstance(spec, Avg):
            s = c = 0
            for t in trends:
                ts, tc = _trend_value(spec, t)
                s, c = s + ts, c + tc
            out[spec.name] = None if c == 0 else s / c
        else:
            raise TypeError(spec)
    return out
