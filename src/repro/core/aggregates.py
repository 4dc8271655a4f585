"""Aggregation functions over event trends at every granularity (paper
Sections 2.3 and 8, Table 8).

The paper's Table 8 generalizes the trend-count recurrences to COUNT(E),
MIN/MAX(E.attr) and SUM(E.attr): events of type ``E`` *update* the
aggregate, all other matched events *propagate* it along the trend digraph.
AVG(E.attr) = SUM(E.attr) / COUNT(E).

All three Cogra aggregators (and the GRETA baseline) share this module.
An aggregator node (a matched event, an event type, or the pattern-grained
last-event chain) carries

* ``count`` — the number of (partial) trends ending at that node, and
* one *slot value* per :class:`AggSpec`.

Each spec implements the Table-8 algebra on its slot:

* ``init_val``  — value for "no trend reaches this node yet",
* ``merge``     — combine slot values of several predecessor nodes,
* ``on_event``  — apply a matched event (given the trend count of the new
  node, i.e. ``e.count`` in the paper's notation),
* ``finalize``  — turn the end-node slot + final count into the result.

This algebra covers exactly the distributive/algebraic functions the paper
supports (Section 2.3, citing Gray et al.'s data-cube classification).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Mapping


@dataclass(frozen=True)
class AggSpec:
    """Base class of aggregation-function specifications."""

    @property
    def name(self) -> str:
        raise NotImplementedError

    def init_val(self):
        return None

    def merge(self, a, b):
        raise NotImplementedError

    def on_event(self, val, etype: str, attrs: Mapping, trend_count):
        raise NotImplementedError

    def finalize(self, val, final_count):
        raise NotImplementedError


@dataclass(frozen=True)
class Count(AggSpec):
    """COUNT(*): the number of finished trends per group (Theorem 4.1)."""

    @property
    def name(self) -> str:
        return "count_star"

    def init_val(self):
        return 0

    def merge(self, a, b):
        return a  # unused: COUNT(*) rides on the shared node count

    def on_event(self, val, etype, attrs, trend_count):
        return val

    def finalize(self, val, final_count):
        return final_count


@dataclass(frozen=True)
class CountType(AggSpec):
    """COUNT(E): sum over finished trends of tr.COUNT(E) (Section 2.3)."""

    etype: str

    @property
    def name(self) -> str:
        return f"count_{self.etype}"

    def init_val(self):
        return 0

    def merge(self, a, b):
        return a + b

    def on_event(self, val, etype, attrs, trend_count):
        # Table 8: e.count_E = e.count + sum of predecessor count_E
        # (val already holds the predecessor sum when this is called).
        return val + trend_count if etype == self.etype else val

    def finalize(self, val, final_count):
        return val


def _min2(a, b):
    if a is None:
        return b
    if b is None:
        return a
    return a if a <= b else b


def _max2(a, b):
    if a is None:
        return b
    if b is None:
        return a
    return a if a >= b else b


@dataclass(frozen=True)
class Min(AggSpec):
    """MIN(E.attr): min over finished trends of tr.MIN(E.attr)."""

    etype: str
    attr: str

    @property
    def name(self) -> str:
        return f"min_{self.etype}_{self.attr}"

    def merge(self, a, b):
        return _min2(a, b)

    def on_event(self, val, etype, attrs, trend_count):
        # Only absorb the value if some (partial) trend actually ends at
        # this event — an event with e.count = 0 extends no trend and must
        # not contribute (it has no adjacent predecessor yet).
        if etype == self.etype and trend_count:
            return _min2(val, attrs[self.attr])
        return val

    def finalize(self, val, final_count):
        return val


@dataclass(frozen=True)
class Max(AggSpec):
    """MAX(E.attr): max over finished trends of tr.MAX(E.attr)."""

    etype: str
    attr: str

    @property
    def name(self) -> str:
        return f"max_{self.etype}_{self.attr}"

    def merge(self, a, b):
        return _max2(a, b)

    def on_event(self, val, etype, attrs, trend_count):
        # See Min.on_event: no contribution when no trend ends here.
        if etype == self.etype and trend_count:
            return _max2(val, attrs[self.attr])
        return val

    def finalize(self, val, final_count):
        return val


@dataclass(frozen=True)
class Sum(AggSpec):
    """SUM(E.attr): sum over finished trends of tr.SUM(E.attr).

    Table 8: an event e of type E contributes ``e.attr * e.count`` — its
    attribute once per trend ending at e.
    """

    etype: str
    attr: str

    @property
    def name(self) -> str:
        return f"sum_{self.etype}_{self.attr}"

    def init_val(self):
        return 0

    def merge(self, a, b):
        return a + b

    def on_event(self, val, etype, attrs, trend_count):
        if etype == self.etype:
            return val + attrs[self.attr] * trend_count
        return val

    def finalize(self, val, final_count):
        return val


@dataclass(frozen=True)
class Avg(AggSpec):
    """AVG(E.attr) = SUM(E.attr) / COUNT(E) per group (Section 2.3).

    The slot value is the pair (sum, count-of-E-events); algebraic, so it
    composes under merge like its distributive components.
    """

    etype: str
    attr: str

    @property
    def name(self) -> str:
        return f"avg_{self.etype}_{self.attr}"

    def init_val(self):
        return (0, 0)

    def merge(self, a, b):
        return (a[0] + b[0], a[1] + b[1])

    def on_event(self, val, etype, attrs, trend_count):
        if etype == self.etype:
            return (val[0] + attrs[self.attr] * trend_count, val[1] + trend_count)
        return val

    def finalize(self, val, final_count):
        s, c = val
        return None if c == 0 else s / c


def init_slots(specs: tuple[AggSpec, ...]) -> list:
    """Fresh slot vector for a node no trend reaches yet."""
    return [s.init_val() for s in specs]


def merge_slots(specs: tuple[AggSpec, ...], dst: list, src: list) -> None:
    """In-place: dst <- merge(dst, src), slot-wise."""
    for i, s in enumerate(specs):
        dst[i] = s.merge(dst[i], src[i])


def apply_event_slots(
    specs: tuple[AggSpec, ...],
    slots: list,
    etype: str,
    attrs: Mapping,
    trend_count,
) -> None:
    """In-place Table-8 event application to a merged predecessor vector."""
    for i, s in enumerate(specs):
        slots[i] = s.on_event(slots[i], etype, attrs, trend_count)


def finalize_slots(specs: tuple[AggSpec, ...], slots: list, final_count) -> dict:
    """Named result row from the end node's slots and the final count."""
    return {s.name: s.finalize(slots[i], final_count) for i, s in enumerate(specs)}
