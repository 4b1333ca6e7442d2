"""Phase-1 DataFrame transforms, oracle-checked against DuckDB SQL."""
import pandas as pd
import pytest

from repro.core.symbolize import threshold_symbols
from repro.datasets import CUT, gen_values_pdf
from repro.oracle import assert_equivalent
from repro.sparkio.transform import (
    dseq_stats,
    event_supports,
    extract_instances,
    symbolize_threshold,
    with_granule,
)

from .spark_helpers import symbols_long_pdf, tiny_profile

pytestmark = pytest.mark.spark


@pytest.fixture(scope="module")
def values_pdf():
    return gen_values_pdf(tiny_profile(), n_groups=2)


@pytest.fixture(scope="module")
def values_df(spark, values_pdf):
    return spark.createDataFrame(values_pdf).cache()


@pytest.fixture(scope="module")
def sym_df(spark):
    pdf = symbols_long_pdf(tiny_profile(), n_groups=2)
    return spark.createDataFrame(pdf).cache()


class TestSymbolize:
    def test_matches_duckdb(self, values_df, values_pdf):
        out = symbolize_threshold(values_df, [CUT], ["0", "1"])
        assert_equivalent(
            out.select("group", "series", "t", "symbol"),
            f"""
            SELECT "group", series, t,
                   CASE WHEN value < {CUT} THEN '0' ELSE '1' END AS symbol
            FROM vals
            """,
            vals=values_pdf,
        )

    def test_matches_pure_python(self, values_df, values_pdf):
        out = (
            symbolize_threshold(values_df, [CUT], ["0", "1"])
            .select("group", "series", "t", "symbol")
            .toPandas()
            .sort_values(["group", "series", "t"])
        )
        for (g, s), sub in values_pdf.groupby(["group", "series"]):
            sub = sub.sort_values("t")
            expect = threshold_symbols(sub["value"].tolist(), [CUT], alphabet=["0", "1"])
            got = out[(out["group"] == g) & (out["series"] == s)]["symbol"].tolist()
            assert got == expect

    def test_multilevel_cuts(self, spark):
        pdf = pd.DataFrame(
            {"group": [0] * 3, "series": ["a"] * 3, "t": [0, 1, 2], "value": [0.0, 5.0, 9.0]}
        )
        out = symbolize_threshold(
            spark.createDataFrame(pdf), [2.0, 8.0], ["L", "M", "H"]
        )
        got = [r.symbol for r in out.orderBy("t").collect()]
        assert got == ["L", "M", "H"]

    def test_label_count_validation(self, values_df):
        with pytest.raises(ValueError):
            symbolize_threshold(values_df, [1.0], ["only"])


class TestGranule:
    def test_with_granule(self, sym_df):
        out = with_granule(sym_df, 4).select("t", "granule").distinct().toPandas()
        assert (out["granule"] == out["t"] // 4).all()


class TestExtractInstances:
    def test_matches_duckdb_gaps_and_islands(self, sym_df):
        out = extract_instances(sym_df, 4)
        pdf = sym_df.toPandas()
        assert_equivalent(
            out,
            """
            WITH runs AS (
              SELECT "group", series, t, symbol, t // 4 AS granule,
                     CASE WHEN lag(symbol) OVER w IS NULL
                            OR lag(symbol) OVER w <> symbol
                            OR lag(t // 4) OVER w <> t // 4
                          THEN 1 ELSE 0 END AS brk
              FROM sym
              WINDOW w AS (PARTITION BY "group", series ORDER BY t)
            ), numbered AS (
              SELECT *, SUM(brk) OVER
                    (PARTITION BY "group", series ORDER BY t) AS run_id
              FROM runs
            )
            SELECT "group", series, granule, symbol,
                   MIN(t) AS start, MAX(t) AS "end"
            FROM numbered
            GROUP BY "group", series, granule, symbol, run_id
            """,
            sym=pdf,
        )

    def test_matches_pure_python_rle(self, sym_df):
        from repro.core.sequences import build_dseq

        out = extract_instances(sym_df, 4).toPandas()
        pdf = sym_df.toPandas()
        for g, sub in pdf.groupby("group"):
            symbols = {
                s: ss.sort_values("t")["symbol"].tolist()
                for s, ss in sub.groupby("series")
            }
            dseq = build_dseq(symbols, 4)
            expect = {
                (i.series, h, i.symbol, i.start, i.end)
                for h in range(dseq.n_granules)
                for i in dseq.instances(h)
            }
            got = {
                (r.series, r.granule, r.symbol, r.start, r.end)
                for r in out[out["group"] == g].itertuples(index=False)
            }
            assert got == expect

    def test_runs_never_span_granules(self, sym_df):
        out = extract_instances(sym_df, 4).toPandas()
        assert ((out["start"] // 4) == (out["end"] // 4)).all()
        assert (out["granule"] == out["start"] // 4).all()


class TestSupportsAndStats:
    def test_event_supports_match_duckdb(self, sym_df):
        inst = extract_instances(sym_df, 4)
        assert_equivalent(
            event_supports(inst),
            """
            SELECT "group", series || ':' || symbol AS event,
                   COUNT(DISTINCT granule) AS sup_size
            FROM inst GROUP BY "group", event
            """,
            inst=inst.toPandas(),
        )

    def test_dseq_stats_shape(self, sym_df):
        stats = dseq_stats(extract_instances(sym_df, 4)).toPandas()
        assert len(stats) == 2  # one row per group
        row = stats[stats["group"] == 0].iloc[0]
        assert row["n_series"] == 6
        assert 6 <= row["n_events"] <= 12
        assert row["n_seq"] <= 48
        assert row["ins_per_seq"] > 1
