"""Phase 2 on Spark: partition by replica group, mine per partition.

``mine_groups`` groups the symbolized fine-granularity DataFrame by the
``group`` key and runs the chosen miner (E-STPM / A-STPM / APS-growth
baseline) inside ``applyInPandas``, so each partition executes the full
pruning machinery locally — the layering the repro band prescribes for
this paper. The returned DataFrame has one row per frequent seasonal
single event or pattern.

``screen_stats`` runs only A-STPM's MI screening per group and reports
the pruned-series / pruned-events percentages (paper Table XI).
"""
from __future__ import annotations

import json
from typing import Iterable

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

from ..core.astpm import mine_approx
from ..core.estpm import MiningResult, mine
from ..core.seasonal import STPMParams
from ..core.sequences import DSeq, build_dseq
from ..baseline.aps import mine_aps

RESULT_SCHEMA = T.StructType(
    [
        T.StructField("group", T.IntegerType()),
        T.StructField("kind", T.StringType()),  # single | pattern
        T.StructField("pattern", T.StringType()),
        T.StructField("k", T.IntegerType()),
        T.StructField("sup_size", T.IntegerType()),
        T.StructField("n_seasons", T.IntegerType()),
        T.StructField("season_starts", T.StringType()),  # json list of positions
    ]
)

SCREEN_SCHEMA = T.StructType(
    [
        T.StructField("group", T.IntegerType()),
        T.StructField("n_series", T.IntegerType()),
        T.StructField("n_series_pruned", T.IntegerType()),
        T.StructField("pct_series_pruned", T.DoubleType()),
        T.StructField("pct_events_pruned", T.DoubleType()),
    ]
)

MINERS = ("estpm", "astpm", "aps")


def _pattern_len_to_k(n_triples: int) -> int:
    # n_triples = k(k-1)/2
    k = 2
    while k * (k - 1) // 2 < n_triples:
        k += 1
    return k


def _result_rows(group: int, res: MiningResult) -> Iterable[dict]:
    for ev, v in sorted(res.singles.items()):
        yield dict(
            group=group, kind="single", pattern=ev, k=1,
            sup_size=len(v.sup), n_seasons=v.n_seasons,
            season_starts=json.dumps([s[0] for s in v.seasons]),
        )
    for pattern, v in sorted(res.patterns.items()):
        yield dict(
            group=group, kind="pattern",
            pattern=" ; ".join(f"{a} {r} {b}" for r, a, b in pattern),
            k=_pattern_len_to_k(len(pattern)),
            sup_size=len(v.sup), n_seasons=v.n_seasons,
            season_starts=json.dumps([s[0] for s in v.seasons]),
        )


def _symbols_from_pdf(pdf: pd.DataFrame) -> dict[str, list[str]]:
    out: dict[str, list[str]] = {}
    for series, sub in pdf.groupby("series"):
        sub = sub.sort_values("t")
        out[str(series)] = sub["symbol"].astype(str).tolist()
    return out


def _dseq_for(symbols: dict[str, list[str]], m: int, ignore_symbols: frozenset) -> DSeq:
    return build_dseq(symbols, m, ignore_symbols=ignore_symbols)


def mine_groups(
    sym_df: DataFrame,
    params: STPMParams,
    m: int,
    *,
    miner: str = "estpm",
    ignore_symbols: frozenset = frozenset(),
    apriori: bool = True,
    transitivity: bool = True,
) -> DataFrame:
    """Run the miner per group over ``(group, series, t, symbol)`` rows."""
    if miner not in MINERS:
        raise ValueError(f"miner must be one of {MINERS}, got {miner!r}")

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        group = int(pdf["group"].iloc[0])
        symbols = _symbols_from_pdf(pdf)
        dseq = _dseq_for(symbols, m, ignore_symbols)
        if miner == "estpm":
            res = mine(dseq, params, apriori=apriori, transitivity=transitivity)
        elif miner == "astpm":
            res = mine_approx(
                symbols, dseq, params, apriori=apriori, transitivity=transitivity
            ).mining
        else:
            res = mine_aps(dseq, params)
        rows = list(_result_rows(group, res))
        return pd.DataFrame(rows, columns=[f.name for f in RESULT_SCHEMA.fields])

    return sym_df.groupBy("group").applyInPandas(fn, RESULT_SCHEMA)


def screen_stats(
    sym_df: DataFrame,
    params: STPMParams,
    m: int,
    *,
    ignore_symbols: frozenset = frozenset(),
) -> DataFrame:
    """A-STPM screening only: per-group pruned series/events percentages."""

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        group = int(pdf["group"].iloc[0])
        symbols = _symbols_from_pdf(pdf)
        dseq = _dseq_for(symbols, m, ignore_symbols)
        approx = mine_approx(symbols, dseq, params.with_(max_k=1))
        rep = approx.screening
        return pd.DataFrame(
            [
                dict(
                    group=group,
                    n_series=rep.n_series,
                    n_series_pruned=len(rep.pruned_series),
                    pct_series_pruned=rep.pct_series_pruned,
                    pct_events_pruned=approx.pct_events_pruned,
                )
            ]
        )

    return sym_df.groupBy("group").applyInPandas(fn, SCREEN_SCHEMA)


def symbols_df_from_pandas(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Helper: lift a long-format pandas symbols frame into Spark."""
    return spark.createDataFrame(pdf)
