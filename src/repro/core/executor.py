"""Runtime Executor dispatch (paper Figure 3).

``aggregate_substream`` routes one time-ordered substream to the
granularity-appropriate Cogra aggregator chosen by the Static Query
Analyzer (Table 4). This is the kernel the Spark runner invokes once per
(group, window) partition.
"""
from __future__ import annotations

from repro.core.events import Event
from repro.core.granularity import Granularity
from repro.core.mixed_grained import MixedGrainedAggregator, aggregate_mixed_grained
from repro.core.pattern_grained import (
    PatternGrainedAggregator,
    aggregate_pattern_grained,
)
from repro.core.query import CompiledQuery
from repro.core.type_grained import TypeGrainedAggregator, aggregate_type_grained
from repro.harness.metrics import KernelResult

_KERNELS = {
    Granularity.TYPE: aggregate_type_grained,
    Granularity.MIXED: aggregate_mixed_grained,
    Granularity.PATTERN: aggregate_pattern_grained,
}

_AGGREGATORS = {
    Granularity.TYPE: TypeGrainedAggregator,
    Granularity.MIXED: MixedGrainedAggregator,
    Granularity.PATTERN: PatternGrainedAggregator,
}


def make_aggregator(cq: CompiledQuery, *, exact: bool = True):
    """Fresh incremental aggregator at the query's selected granularity —
    the per-key state object of the Structured Streaming runner."""
    return _AGGREGATORS[cq.granularity](cq, exact=exact)


def aggregate_substream(
    events: list[Event],
    cq: CompiledQuery,
    *,
    exact: bool = True,
    trace: list | None = None,
) -> KernelResult:
    """Incrementally aggregate the trends of one substream with the
    coarsest-granularity Cogra aggregator selected for the query."""
    return _KERNELS[cq.granularity](events, cq, exact=exact, trace=trace)
