"""Sliding-window id assignment (paper Section 7).

WITHIN ``size`` SLIDE ``slide`` partitions the unbounded stream into
overlapping windows; window ``k`` spans ``[k*slide, k*slide + size)``.
An event at time ``t`` falls into ``size/slide`` consecutive windows and
is tagged with each window identifier *wid* [Li et al., SIGMOD'05], so
per-(group, wid) aggregation is an ordinary keyed aggregation — the
Catalyst side of the Cogra executor.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core.query import WindowSpec


def wid_sequence_expr(window: WindowSpec, time_col: str) -> Column:
    """Array column of the window ids covering ``time_col``.

    wid range: max(0, floor((t - size)/slide) + 1) .. floor(t/slide),
    matching :meth:`repro.core.query.WindowSpec.wids_for`.
    """
    t = F.col(time_col)
    lo = F.greatest(
        F.lit(0),
        (F.floor((t - F.lit(window.size)) / F.lit(window.slide)) + F.lit(1)),
    )
    hi = F.floor(t / F.lit(window.slide))
    return F.sequence(lo.cast("long"), hi.cast("long"))


def with_window_ids(
    df: DataFrame, window: WindowSpec | None, time_col: str
) -> DataFrame:
    """Explode each event into one row per covering window (column ``wid``).

    With no window clause the whole stream is a single window (wid 0).
    """
    if window is None:
        return df.withColumn("wid", F.lit(0).cast("long"))
    return df.withColumn("wid", F.explode(wid_sequence_expr(window, time_col)))


def window_bounds(window: WindowSpec, wid: int) -> tuple[int, int]:
    """Half-open time span [start, end) of window ``wid``."""
    return wid * window.slide, wid * window.slide + window.size
