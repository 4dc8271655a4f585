"""WindowSpec arithmetic and Query compilation plumbing (Section 7)."""
import pytest

from repro.core.aggregates import Avg, Count, Min
from repro.core.granularity import Semantics
from repro.core.predicates import AdjacentPredicate, LocalPredicate
from repro.core.query import Query, WindowSpec


class TestWindowSpec:
    def test_validation(self):
        with pytest.raises(ValueError):
            WindowSpec(size=0, slide=1)
        with pytest.raises(ValueError):
            WindowSpec(size=10, slide=0)
        with pytest.raises(ValueError):
            WindowSpec(size=10, slide=3)  # size must be multiple of slide

    @pytest.mark.parametrize(
        "t, wids",
        [
            (0, [0]),
            (4, [0]),
            (5, [0, 1]),
            (9, [0, 1]),
            (10, [1, 2]),
            (23, [3, 4]),
        ],
    )
    def test_wids_for_10_5(self, t, wids):
        """Window k spans [5k, 5k+10); an event sits in size/slide = 2
        windows (except at the stream head)."""
        assert list(WindowSpec(size=10, slide=5).wids_for(t)) == wids

    def test_tumbling_window(self):
        w = WindowSpec(size=10, slide=10)
        assert list(w.wids_for(0)) == [0]
        assert list(w.wids_for(9)) == [0]
        assert list(w.wids_for(10)) == [1]

    def test_paper_q1_window(self):
        """WITHIN 10 minutes SLIDE 30 seconds: 20 windows per event."""
        w = WindowSpec(size=600, slide=30)
        assert len(list(w.wids_for(12_345))) == 20

    def test_event_in_window_iff_wid_listed(self):
        w = WindowSpec(size=12, slide=4)
        for t in range(0, 50):
            wids = set(w.wids_for(t))
            for k in range(0, 20):
                in_window = k * 4 <= t < k * 4 + 12
                assert (k in wids) == in_window, (t, k)


class TestQueryCompile:
    def test_attr_cols_collected(self):
        cq = Query(
            pattern="SEQ(D+, U)",
            semantics=Semantics.ANY,
            aggregates=(Count(), Avg("U", "price"), Min("D", "low")),
            adjacent_predicates=(AdjacentPredicate("D", "price", "<", "D", "price"),),
            local_predicates=(LocalPredicate("volume", ">", 0, etype="D"),),
        ).compile()
        assert set(cq.attr_cols) == {"price", "low", "volume"}

    def test_pattern_object_accepted(self):
        from repro.core.pattern import parse_pattern

        p = parse_pattern("A+")
        cq = Query(pattern=p, semantics=Semantics.ANY).compile()
        assert cq.analysis.start == "A"

    def test_compiled_is_picklable(self):
        import pickle

        cq = Query(pattern="(SEQ(A+, B))+", semantics=Semantics.NEXT).compile()
        assert pickle.loads(pickle.dumps(cq)).analysis.end == "B"
