"""GRETA baseline — online event-grained trend aggregation (paper §9.1).

GRETA [Poppe et al., VLDB'17] avoids trend construction but maintains an
aggregate *per matched event*: every matched event is inserted into the
GRETA graph with its intermediate count, and a new event sums the counts
of all compatible predecessor events (edges are recomputed, not stored).
Supports skip-till-any-match only (Table 9). Time O(n^2), space O(n) —
the finest granularity, which Cogra's Table-4 selection improves on.
"""
from __future__ import annotations

import time

from repro.core.aggregates import (
    apply_event_slots,
    finalize_slots,
    init_slots,
    merge_slots,
)
from repro.core.events import Event
from repro.core.granularity import Semantics
from repro.core.predicates import adjacency_holds
from repro.core.query import CompiledQuery
from repro.harness.metrics import (
    BYTES_PER_AGG,
    BYTES_PER_EVENT,
    Budget,
    BudgetExceeded,
    KernelResult,
    StateMeter,
)


def run_greta(
    events: list[Event],
    cq: CompiledQuery,
    *,
    exact: bool = True,
    budget: Budget | None = None,
) -> KernelResult:
    """Event-grained online aggregation over one substream (ANY only)."""
    if cq.semantics is not Semantics.ANY:
        raise ValueError("GRETA supports skip-till-any-match only")
    t0 = time.perf_counter()
    budget = budget or Budget()
    meter = StateMeter()
    an = cq.analysis
    specs = cq.specs
    preds = cq.adjacent_predicates
    nslots = len(specs)
    zero = 0 if exact else 0.0
    one = 1 if exact else 1.0

    # The GRETA graph: every matched event with its event-grained
    # aggregates, bucketed by type for predecessor lookups.
    graph: dict[str, list[tuple[Event, object, list]]] = {
        t: [] for t in an.pred_types
    }
    final_count = zero
    final_slots = init_slots(specs)
    n = 0
    try:
        for e in events:
            et = e.etype
            if et not in an.pred_types:
                continue
            n += 1
            e_count = one if et == an.start else zero
            slots = init_slots(specs)
            for ep_type in an.pred_types[et]:
                for p_event, p_count, p_slots in graph[ep_type]:
                    budget.charge(1)
                    if p_event.time < e.time and adjacency_holds(
                        preds, ep_type, p_event.attrs, et, e.attrs
                    ):
                        e_count += p_count
                        if nslots:
                            merge_slots(specs, slots, p_slots)
            apply_event_slots(specs, slots, et, e.attrs, e_count)
            graph[et].append((e, e_count, slots))
            meter.add(BYTES_PER_EVENT + (1 + nslots) * BYTES_PER_AGG)
            if et == an.end:
                final_count += e_count
                for i in range(nslots):
                    final_slots[i] = specs[i].merge(final_slots[i], slots[i])
    except BudgetExceeded:
        return KernelResult(
            aggregates={s.name: None for s in specs},
            events_processed=n,
            peak_state_bytes=meter.peak,
            kernel_seconds=time.perf_counter() - t0,
            dnf=True,
        )
    return KernelResult(
        aggregates=finalize_slots(specs, final_slots, final_count),
        events_processed=n,
        peak_state_bytes=meter.peak,
        kernel_seconds=time.perf_counter() - t0,
    )
