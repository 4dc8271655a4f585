"""Metrics substrate: StateMeter accounting and Budget guards."""
import time

import pytest

from repro.harness.metrics import (
    BYTES_PER_AGG,
    BYTES_PER_EVENT,
    Budget,
    BudgetExceeded,
    KernelResult,
    StateMeter,
)


class TestStateMeter:
    def test_peak_tracks_high_water_mark(self):
        m = StateMeter()
        m.add(100)
        m.add(50)
        m.remove(120)
        m.add(10)
        assert m.current == 40
        assert m.peak == 150

    def test_initially_zero(self):
        m = StateMeter()
        assert m.current == 0 and m.peak == 0

    def test_nominal_sizes(self):
        assert BYTES_PER_AGG == 8
        assert BYTES_PER_EVENT == 48


class TestBudget:
    def test_unit_budget_raises(self):
        b = Budget(max_units=10, max_seconds=1e9)
        b.charge(10)
        with pytest.raises(BudgetExceeded):
            b.charge(1)

    def test_time_budget_raises(self):
        b = Budget(max_units=10**12, max_seconds=0.01)
        time.sleep(0.02)
        with pytest.raises(BudgetExceeded):
            b.charge(5000)  # crosses the check interval

    def test_within_budget_is_silent(self):
        b = Budget(max_units=1000, max_seconds=10)
        for _ in range(10):
            b.charge(10)
        assert b.units == 100


class TestKernelResult:
    def test_defaults(self):
        r = KernelResult()
        assert r.aggregates == {}
        assert not r.dnf
        assert r.trends_constructed == 0
