"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# ---------------------------------------------------------------------------
# Event-stream workloads for the Cogra reproduction (paper Section 9.1).
#
# The paper's real data sets (PAMAP2 physical-activity reports, EODData
# stock ticks) are not available offline; these generators produce the same
# schemas and the stream properties the experiments exercise (group counts,
# type alternation, contiguity breaks). Substitutions are documented in
# DESIGN.md. All generators are deterministic in ``seed`` and emit strictly
# increasing integer timestamps, so every (group, window) substream is
# totally ordered (the paper's stream-transaction requirement, Section 8).
# ---------------------------------------------------------------------------


def activity_stream_pdf(
    *, n: int, n_persons: int = 14, n_activities: int = 18, seed: int = 10
) -> pd.DataFrame:
    """Physical-activity monitoring stream (PAMAP2-like, paper §9.1).

    Columns: time (s), person, activity, rate (heart rate), etype ("M").
    The heart rate is a per-person random walk that rises ~55% of steps,
    so contiguous increasing-rate trends (query q1) exist but break often.
    Activities switch occasionally; ids < n_activities/2 are "passive".
    """
    g = _rng(seed)
    person = g.integers(0, n_persons, n)
    activity = np.empty(n, dtype=np.int64)
    rate = np.empty(n, dtype=np.float64)
    cur_act = g.integers(0, n_activities, n_persons)
    cur_rate = g.uniform(60, 100, n_persons)
    switch = g.random(n) < 0.05
    step = np.where(g.random(n) < 0.55, 1.0, -1.0) * g.uniform(0.1, 3.0, n)
    new_act = g.integers(0, n_activities, n)
    for i in range(n):
        p = person[i]
        if switch[i]:
            cur_act[p] = new_act[i]
        cur_rate[p] = np.clip(cur_rate[p] + step[i], 40.0, 200.0)
        activity[i] = cur_act[p]
        rate[i] = cur_rate[p]
    return pd.DataFrame(
        {
            "time": np.arange(1, n + 1, dtype=np.int64),
            "person": person,
            "activity": activity,
            "rate": rate,
            "etype": np.repeat("M", n),
        }
    )


def stock_stream_pdf(
    *,
    n: int,
    n_companies: int = 19,
    n_sectors: int = 10,
    down_share: float = 0.5,
    seed: int = 11,
) -> pd.DataFrame:
    """Stock transaction stream (EODData-like, paper §9.1).

    Columns: time (s), company, sector, price, etype in {"D", "U"}
    (down-tick / up-tick records). Queries q3-style run Kleene patterns
    over D/U records per company; ``sector = company % n_sectors``.
    Prices are uniform on [0, 1) so the selectivity of price predicates on
    adjacent events is analytic (see :func:`selectivity_offset`).
    """
    g = _rng(seed)
    company = g.integers(0, n_companies, n)
    return pd.DataFrame(
        {
            "time": np.arange(1, n + 1, dtype=np.int64),
            "company": company,
            "sector": company % n_sectors,
            "price": g.random(n),
            "etype": np.where(g.random(n) < down_share, "D", "U"),
        }
    )


def transport_stream_pdf(
    *,
    n: int,
    n_passengers: int = 30,
    n_stations: int = 100,
    noise_share: float = 0.2,
    seed: int = 12,
) -> pd.DataFrame:
    """Public-transportation trips (paper's synthetic data set, §9.1).

    Per passenger, trips of the form Accept, (Call, Cancel)+, Finish with
    interleaved irrelevant events (InTransit, Dropoff) that
    skip-till-next-match skips (query q2). Columns: time (s), passenger,
    station, wait (s), etype.
    """
    g = _rng(seed)
    rows_t: list[int] = []
    rows_p: list[int] = []
    rows_e: list[str] = []
    # Per-passenger trip-phase state machine; one event per global tick.
    phase = np.zeros(n_passengers, dtype=np.int64)  # 0=Accept,1=Call,2=Cancel,3=maybe-Finish
    for t in range(1, n + 1):
        p = int(g.integers(0, n_passengers))
        if g.random() < noise_share:
            rows_t.append(t); rows_p.append(p)
            rows_e.append("InTransit" if g.random() < 0.5 else "Dropoff")
            continue
        ph = phase[p]
        if ph == 0:
            rows_e.append("Accept"); phase[p] = 1
        elif ph == 1:
            rows_e.append("Call"); phase[p] = 2
        elif ph == 2:
            rows_e.append("Cancel"); phase[p] = 3
        else:
            if g.random() < 0.5:
                rows_e.append("Call"); phase[p] = 2
            else:
                rows_e.append("Finish"); phase[p] = 0
        rows_t.append(t); rows_p.append(p)
    m = len(rows_t)
    return pd.DataFrame(
        {
            "time": np.asarray(rows_t, dtype=np.int64),
            "passenger": np.asarray(rows_p, dtype=np.int64),
            "station": g.integers(0, n_stations, m),
            "wait": g.uniform(0, 600, m),
            "etype": rows_e,
        }
    )


def selectivity_offset(s: float) -> float:
    """Offset c so that P(p1 < p2 + c) = s for independent uniform [0,1)
    prices p1, p2 — the selectivity knob of the Figure-9 experiment.

    The difference d = p1 - p2 is triangular on [-1, 1]:
    P(d < c) = (1+c)^2/2 for c <= 0 and 1 - (1-c)^2/2 for c >= 0.
    """
    if not 0.0 < s < 1.0:
        raise ValueError("selectivity must be in (0, 1)")
    if s <= 0.5:
        return (2 * s) ** 0.5 - 1.0
    return 1.0 - (2 * (1 - s)) ** 0.5


def activity_stream(spark: SparkSession, **kw) -> DataFrame:
    """Spark DataFrame wrapper of :func:`activity_stream_pdf`."""
    return spark.createDataFrame(activity_stream_pdf(**kw))


def stock_stream(spark: SparkSession, **kw) -> DataFrame:
    """Spark DataFrame wrapper of :func:`stock_stream_pdf`."""
    return spark.createDataFrame(stock_stream_pdf(**kw))


def transport_stream(spark: SparkSession, **kw) -> DataFrame:
    """Spark DataFrame wrapper of :func:`transport_stream_pdf`."""
    return spark.createDataFrame(transport_stream_pdf(**kw))
