"""Shared glue between harnesses and the Spark layer."""
from __future__ import annotations

import pandas as pd

from ..datasets import DatasetProfile, gen_symbols


def symbols_long_pdf(p: DatasetProfile, n_groups: int = 1) -> pd.DataFrame:
    """Long-format ``(group, series, t, symbol)`` frame for ``mine_groups``."""
    frames = []
    for g in range(n_groups):
        for series, syms in gen_symbols(p, g).items():
            frames.append(
                pd.DataFrame(
                    {"group": g, "series": series, "t": range(len(syms)), "symbol": syms}
                )
            )
    return pd.concat(frames, ignore_index=True)


def symbols_df(spark, p: DatasetProfile, n_groups: int = 1):
    return spark.createDataFrame(symbols_long_pdf(p, n_groups))
