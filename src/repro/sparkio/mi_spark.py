"""DataFrame-side mutual information (Section V in Catalyst terms).

The joint symbol distribution of every series pair is a self-join on
``(group, t)`` followed by a count aggregation — all shuffle-side work.
The (tiny) per-pair NMI finalization happens on the driver with the
same formulas as :mod:`repro.core.mi`, so the two paths can be diffed in
tests, and the joint-count DataFrame itself is oracle-checked against
DuckDB SQL.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..core.mi import entropy


def pair_joint_counts(sym_df: DataFrame) -> DataFrame:
    """Joint symbol counts for all ordered series pairs (x < y).

    Input ``(group, series, t, symbol)``; output
    ``(group, sx, sy, symx, symy, n)``.
    """
    a = sym_df.select(
        "group", F.col("series").alias("sx"), "t", F.col("symbol").alias("symx")
    )
    b = sym_df.select(
        "group", F.col("series").alias("sy"), "t", F.col("symbol").alias("symy")
    )
    joined = a.join(b, on=["group", "t"]).where(F.col("sx") < F.col("sy"))
    return joined.groupBy("group", "sx", "sy", "symx", "symy").agg(
        F.count(F.lit(1)).alias("n")
    )


def nmi_table(sym_df: DataFrame) -> pd.DataFrame:
    """Per-pair NMI in both directions, finalized on the driver.

    Returns a pandas frame ``(group, sx, sy, nmi_xy, nmi_yx, min_nmi)``.
    The driver-side reduction is O(pairs * alphabet^2) — trivial next to
    the joint-count shuffle.
    """
    counts = pair_joint_counts(sym_df).toPandas()
    rows = []
    for (group, sx, sy), sub in counts.groupby(["group", "sx", "sy"]):
        total = sub["n"].sum()
        joint = {
            (r.symx, r.symy): r.n / total for r in sub.itertuples(index=False)
        }
        px: dict[str, float] = {}
        py: dict[str, float] = {}
        for (x, y), p in joint.items():
            px[x] = px.get(x, 0.0) + p
            py[y] = py.get(y, 0.0) + p
        import math

        mi = sum(
            p * math.log2(p / (px[x] * py[y])) for (x, y), p in joint.items() if p > 0
        )
        mi = max(0.0, mi)
        hx, hy = entropy(px), entropy(py)
        nmi_xy = min(1.0, mi / hx) if hx > 0 else 0.0
        nmi_yx = min(1.0, mi / hy) if hy > 0 else 0.0
        rows.append(
            dict(
                group=group, sx=sx, sy=sy,
                nmi_xy=nmi_xy, nmi_yx=nmi_yx, min_nmi=min(nmi_xy, nmi_yx),
            )
        )
    return pd.DataFrame(
        rows, columns=["group", "sx", "sy", "nmi_xy", "nmi_yx", "min_nmi"]
    )
