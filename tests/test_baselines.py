"""Baseline-specific behavior: capability envelope (Table 9), budget/DNF
handling, two-step construction counts, and the flattening machinery."""
import pytest

from repro.baselines.aseq import run_aseq
from repro.baselines.bruteforce import (
    TrendExplosion,
    aggregate_bruteforce,
    enumerate_trends,
)
from repro.baselines.flink_like import run_flink_like, type_paths
from repro.baselines.greta import run_greta
from repro.baselines.registry import run_approach
from repro.baselines.sase import run_sase
from repro.core.events import Event
from repro.core.granularity import Semantics
from repro.core.predicates import AdjacentPredicate
from repro.core.query import Query
from repro.harness.metrics import Budget


def mk(types: str) -> list[Event]:
    return [Event(i, i + 1, t, {"v": i}) for i, t in enumerate(types)]


def cq_of(pattern="(SEQ(A+, B))+", semantics=Semantics.ANY, preds=()):
    return Query(
        pattern=pattern, semantics=semantics, adjacent_predicates=preds
    ).compile()


class TestCapabilityErrors:
    def test_greta_rejects_next_cont(self):
        for sem in (Semantics.NEXT, Semantics.CONT):
            with pytest.raises(ValueError):
                run_greta(mk("AB"), cq_of(semantics=sem))

    def test_aseq_rejects_non_any_and_predicates(self):
        with pytest.raises(ValueError):
            run_aseq(mk("AB"), cq_of(semantics=Semantics.NEXT))
        with pytest.raises(ValueError):
            run_aseq(
                mk("AB"),
                cq_of(preds=(AdjacentPredicate("A", "v", "<", "A", "v"),)),
            )

    def test_flink_rejects_next(self):
        with pytest.raises(ValueError):
            run_flink_like(mk("AB"), cq_of(semantics=Semantics.NEXT))

    def test_registry_refuses_unsupported(self):
        with pytest.raises(ValueError, match="Table 9"):
            run_approach("aseq", mk("AB"), cq_of(semantics=Semantics.CONT))


class TestBudgets:
    def test_sase_any_dnf_on_tiny_budget(self):
        events = mk("A" * 18 + "B")
        res = run_sase(events, cq_of(), budget=Budget(max_units=1_000))
        assert res.dnf
        assert all(v is None for v in res.aggregates.values())

    def test_flink_any_dnf_on_tiny_budget(self):
        events = mk("A" * 18 + "B")
        res = run_flink_like(events, cq_of(), budget=Budget(max_units=1_000))
        assert res.dnf

    def test_sase_completes_within_budget(self):
        events = mk("AABAB")
        res = run_sase(events, cq_of(), budget=Budget(max_units=100_000))
        assert not res.dnf
        assert res.aggregates == aggregate_bruteforce(events, cq_of())

    def test_bruteforce_explosion_guard(self):
        events = mk("A" * 25)
        with pytest.raises(TrendExplosion):
            enumerate_trends(events, cq_of("A+"), max_trends=1_000)


class TestTwoStepAccounting:
    def test_sase_counts_constructed_trends(self):
        events = mk("ABAABAB")
        cq = cq_of()
        res = run_sase(events, cq)
        assert res.trends_constructed == res.aggregates["count_star"]
        assert res.peak_state_bytes > 0

    def test_flink_stores_all_sequences(self):
        events = mk("AAB")
        cq = cq_of()
        res = run_flink_like(events, cq)
        # Trends: (a1,b), (a2,b), (a1,a2,b) -> 3 stored sequences.
        assert res.trends_constructed == 3
        assert res.aggregates["count_star"] == 3

    def test_flink_memory_exceeds_sase_on_many_trends(self):
        """Flink stores every sequence; SASE only the current DFS path."""
        events = mk("A" * 12 + "B")
        cq = cq_of()
        flink = run_flink_like(events, cq)
        sase = run_sase(events, cq)
        assert flink.peak_state_bytes > sase.peak_state_bytes


class TestFlattening:
    def test_type_paths_running_example(self):
        cq = cq_of()
        b = Budget()
        assert type_paths(cq, 2, b) == [("A", "B")]
        assert set(type_paths(cq, 4, b)) == {
            ("A", "A", "A", "B"),
            ("A", "B", "A", "B"),
        }
        assert type_paths(cq, 1, b) == []  # no 1-event match of (SEQ(A+,B))+

    def test_type_paths_q2(self):
        cq = cq_of("SEQ(Accept, (SEQ(Call, Cancel))+, Finish)")
        b = Budget()
        assert type_paths(cq, 4, b) == [("Accept", "Call", "Cancel", "Finish")]
        assert type_paths(cq, 5, b) == []
        assert len(type_paths(cq, 6, b)) == 1

    def test_flatten_cap_bounds_lengths(self):
        events = mk("AAAAB")
        cq = cq_of()
        capped = run_flink_like(events, cq, flatten_cap=2)
        full = run_flink_like(events, cq)
        # Cap 2 only finds the length-2 trends (single-a before the b).
        assert capped.aggregates["count_star"] == 4
        assert full.aggregates["count_star"] == 2 ** 4 - 1

    def test_aseq_flatten_cap(self):
        events = mk("AAAA")
        cq = cq_of("A+")
        assert run_aseq(events, cq, flatten_cap=1).aggregates["count_star"] == 4
        assert run_aseq(events, cq).aggregates["count_star"] == 2 ** 4 - 1


class TestGretaProperties:
    def test_greta_state_grows_with_events(self):
        cq = cq_of()
        small = run_greta(mk("AB" * 3), cq)
        large = run_greta(mk("AB" * 30), cq)
        assert large.peak_state_bytes > small.peak_state_bytes * 5

    def test_cogra_state_constant_in_events(self):
        cq = cq_of()
        small = run_approach("cogra", mk("AB" * 3), cq)
        large = run_approach("cogra", mk("AB" * 30), cq)
        assert small.peak_state_bytes == large.peak_state_bytes
