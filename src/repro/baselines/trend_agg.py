"""Shared second-step aggregation for the two-step baselines.

SASE and the Flink-like baseline first *construct* trends and only then
aggregate them (paper Table 1). :class:`TrendAccumulator` consumes one
materialized trend at a time and folds it into the query's aggregates —
so a two-step kernel need not hold every trend at once unless its memory
model says so (Flink stores all constructed sequences; SASE keeps only the
current one, Section 9.3).
"""
from __future__ import annotations

from repro.core.aggregates import AggSpec, Avg, Count, CountType, Max, Min, Sum
from repro.core.events import Event


class TrendAccumulator:
    """Fold materialized trends into Definition-6 aggregates."""

    def __init__(self, specs: tuple[AggSpec, ...]) -> None:
        self.specs = specs
        self.count = 0
        self.vals: dict[str, object] = {}
        for s in specs:
            if isinstance(s, (CountType, Sum)):
                self.vals[s.name] = 0
            elif isinstance(s, Avg):
                self.vals[s.name] = (0, 0)
            else:
                self.vals[s.name] = None

    def add_trend(self, trend: tuple[Event, ...]) -> None:
        self.count += 1
        for s in self.specs:
            if isinstance(s, Count):
                continue
            if isinstance(s, CountType):
                self.vals[s.name] += sum(1 for e in trend if e.etype == s.etype)
                continue
            ev = [e.attrs[s.attr] for e in trend if e.etype == s.etype]
            if isinstance(s, Sum):
                self.vals[s.name] += sum(ev)
            elif isinstance(s, Avg):
                a, c = self.vals[s.name]
                self.vals[s.name] = (a + sum(ev), c + len(ev))
            elif isinstance(s, Min):
                if ev:
                    cur = self.vals[s.name]
                    m = min(ev)
                    self.vals[s.name] = m if cur is None else min(cur, m)
            elif isinstance(s, Max):
                if ev:
                    cur = self.vals[s.name]
                    m = max(ev)
                    self.vals[s.name] = m if cur is None else max(cur, m)
            else:
                raise TypeError(s)

    def result(self) -> dict:
        out: dict = {}
        for s in self.specs:
            if isinstance(s, Count):
                out[s.name] = self.count
            elif isinstance(s, Avg):
                a, c = self.vals[s.name]
                out[s.name] = None if c == 0 else a / c
            else:
                out[s.name] = self.vals[s.name]
        return out
