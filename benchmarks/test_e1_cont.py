"""Benchmark E1 (paper Figure 5): contiguous semantics, q1-style query
over the physical-activity stream — Flink vs SASE vs Cogra."""
import pytest

from benchmarks._common import run_all_substreams, substreams
from repro.core.aggregates import Count
from repro.core.granularity import Semantics
from repro.core.predicates import AdjacentPredicate, LocalPredicate
from repro.core.query import Query
from repro.synth_data import activity_stream_pdf

N = 20_000
QUERY = Query(
    pattern="M+",
    semantics=Semantics.CONT,
    aggregates=(Count(),),
    adjacent_predicates=(AdjacentPredicate("M", "rate", "<", "M", "rate"),),
    local_predicates=(LocalPredicate("activity", "<", 9, etype="M"),),
    partition_by=("person",),
)


@pytest.fixture(scope="module")
def streams():
    pdf = activity_stream_pdf(n=N, seed=10)
    pdf = pdf[pdf.activity < 9]  # local predicate, prefiltered like Catalyst
    return substreams(pdf, ["person"], ("rate",))


@pytest.mark.parametrize("approach", ["flink", "sase", "cogra"])
def test_e1_cont(benchmark, streams, approach):
    total = benchmark.pedantic(
        run_all_substreams,
        args=(streams, QUERY, approach),
        kwargs={"flatten_cap": 64},
        rounds=3, iterations=1, warmup_rounds=0,
    )
    assert total > 0
