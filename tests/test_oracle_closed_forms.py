"""DuckDB-oracle checks of trend counts with known closed forms.

For simple patterns the paper's trend counts have SQL-expressible closed
forms per substream; running Cogra through the full Spark pipeline and
diffing against DuckDB SQL catches wrong results end-to-end (not just
"it ran"):

* ``A+`` under ANY  -> 2^n - 1 trends per group,
* ``A+`` under NEXT -> n(n+1)/2 trends per group,
* ``A+`` under CONT with noise events -> sum over contiguous islands of
  m(m+1)/2 (gaps-and-islands SQL).
"""
import numpy as np
import pandas as pd
import pytest

from repro.core.granularity import Semantics
from repro.core.query import Query
from repro.core.spark_runner import run_query
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def grouped_pdf():
    g = np.random.default_rng(42)
    n = 60
    return pd.DataFrame(
        {
            "time": np.arange(1, n + 1),
            "grp": g.integers(0, 4, n),
            "etype": np.repeat("A", n),
        }
    )


def _spark_counts(spark, pdf, semantics):
    q = Query(pattern="A+", semantics=semantics, partition_by=("grp",))
    return run_query(spark.createDataFrame(pdf), q).select("grp", "count_star")


def test_any_power_closed_form(spark, grouped_pdf):
    out = _spark_counts(spark, grouped_pdf, Semantics.ANY)
    sql = """
        SELECT grp, CAST(pow(2, COUNT(*)) - 1 AS DOUBLE) AS count_star
        FROM events GROUP BY grp
    """
    assert_equivalent(out, sql, events=grouped_pdf)


def test_next_triangular_closed_form(spark, grouped_pdf):
    out = _spark_counts(spark, grouped_pdf, Semantics.NEXT)
    sql = """
        SELECT grp, CAST(COUNT(*) * (COUNT(*) + 1) / 2 AS DOUBLE) AS count_star
        FROM events GROUP BY grp
    """
    assert_equivalent(out, sql, events=grouped_pdf)


def test_cont_islands_closed_form(spark):
    """With irrelevant noise events breaking contiguity, the CONT count is
    the sum of m(m+1)/2 over maximal runs of A events per group."""
    g = np.random.default_rng(7)
    n = 120
    pdf = pd.DataFrame(
        {
            "time": np.arange(1, n + 1),
            "grp": g.integers(0, 3, n),
            "etype": np.where(g.random(n) < 0.7, "A", "C"),
        }
    )
    out = _spark_counts(spark, pdf, Semantics.CONT)
    sql = """
        WITH marked AS (
            SELECT grp, etype, time,
                   ROW_NUMBER() OVER (PARTITION BY grp ORDER BY time)
                 - ROW_NUMBER() OVER (PARTITION BY grp, etype ORDER BY time)
                   AS island
            FROM events
        ), runs AS (
            SELECT grp, COUNT(*) AS m FROM marked
            WHERE etype = 'A' GROUP BY grp, island
        )
        SELECT g.grp, CAST(COALESCE(SUM(r.m * (r.m + 1) / 2), 0) AS DOUBLE)
               AS count_star
        FROM (SELECT DISTINCT grp FROM events) g
        LEFT JOIN runs r ON g.grp = r.grp
        GROUP BY g.grp
    """
    assert_equivalent(out, sql, events=pdf)


def test_seq_pair_count_closed_form(spark):
    """SEQ(A, B) under ANY counts (a, b) pairs with a.time < b.time."""
    g = np.random.default_rng(3)
    n = 80
    pdf = pd.DataFrame(
        {
            "time": np.arange(1, n + 1),
            "grp": g.integers(0, 3, n),
            "etype": np.where(g.random(n) < 0.5, "A", "B"),
        }
    )
    q = Query(pattern="SEQ(A, B)", semantics=Semantics.ANY, partition_by=("grp",))
    out = run_query(spark.createDataFrame(pdf), q).select("grp", "count_star")
    sql = """
        SELECT g.grp, CAST(COALESCE(SUM(cnt), 0) AS DOUBLE) AS count_star
        FROM (SELECT DISTINCT grp FROM events) g
        LEFT JOIN (
            SELECT a.grp, COUNT(*) AS cnt
            FROM events a JOIN events b
              ON a.grp = b.grp AND a.time < b.time
             AND a.etype = 'A' AND b.etype = 'B'
            GROUP BY a.grp
        ) p ON g.grp = p.grp
        GROUP BY g.grp
    """
    assert_equivalent(out, sql, events=pdf)
