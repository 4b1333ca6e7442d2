"""Experiment harnesses: sanity of every table + paper-shape assertions."""
import pytest

from repro.experiments import paper_numbers as P
from repro.experiments.qualitative import month_of, season_months, table08_qualitative
from repro.experiments.tables import (
    accuracy_synthetic_table,
    accuracy_table,
    epsilon_table,
    pattern_count_table,
    pruning_ablation,
    pruning_table,
    runtime_comparison,
    table05_characteristics,
)


class TestTable05:
    def test_matches_profile_shapes(self):
        df = table05_characteristics().set_index("dataset")
        assert df.loc["re", "n_seq"] == 1460
        assert df.loc["inf", "n_seq"] == 608
        assert (df["n_events"] == 2 * df["n_series"]).all()  # binary alphabets
        assert (df["ins_per_seq"] > 1).all()

    def test_paper_numbers_available(self):
        assert set(P.TABLE_V) == {"re", "sc", "inf", "hfm"}


class TestPatternCounts:
    @pytest.fixture(scope="class")
    def re_table(self):
        return pattern_count_table("re")

    def test_monotone_in_max_period(self, re_table):
        """Higher maxPeriod -> more patterns (Tables IX/X trend)."""
        for col in re_table.columns[1:]:
            vals = re_table[col].tolist()
            assert vals == sorted(vals), col

    def test_monotone_in_min_season_and_density(self, re_table):
        """Higher minSeason / minDensity -> fewer patterns."""
        for _, row in re_table.iterrows():
            for md_hi, md_lo in ((0.75, 0.5), (1.0, 0.75)):
                for ms in (4, 8, 12):
                    assert row[f"{ms}-{md_hi}"] <= row[f"{ms}-{md_lo}"]
            for ms_hi, ms_lo in ((8, 4), (12, 8)):
                for md in (0.5, 0.75, 1.0):
                    assert row[f"{ms_hi}-{md}"] <= row[f"{ms_lo}-{md}"]

    def test_nonempty(self, re_table):
        assert (re_table.drop(columns="max_period_pct").sum(axis=1) > 0).all()


class TestAccuracy:
    def test_monotone_toward_100(self):
        df = accuracy_table("inf", min_seasons=(8, 16), min_densities=(0.5, 1.0))
        assert df.iloc[-1]["md1.0"] >= df.iloc[0]["md0.5"]
        assert df.iloc[-1]["md1.0"] == 100.0

    def test_bounded(self):
        df = accuracy_table("re", min_seasons=(8,), min_densities=(0.75,))
        v = df.iloc[0]["md0.75"]
        assert 0 <= v <= 100


class TestPruning:
    @pytest.fixture(scope="class")
    def table(self):
        return pruning_table("inf", n_series_sweep=(30, 50))

    def test_band_matches_paper_direction(self, table):
        """Pruned share declines with scale, lands in the paper's ~17-43%."""
        col = "series_12-0.5"
        assert table.iloc[1][col] < table.iloc[0][col]
        assert 15 <= table.iloc[1][col] <= 50

    def test_events_share_positive(self, table):
        assert (table["events_12-0.5"] > 0).all()


class TestAccuracySynthetic:
    def test_strict_combo_perfect(self):
        df = accuracy_synthetic_table("inf", n_series_sweep=(30,), combos=((20, 1.0),))
        assert df.iloc[0]["20-1.0"] == 100.0


class TestEpsilon:
    def test_loss_small_and_nonnegative(self):
        df = epsilon_table(datasets=("inf",), eps_values=(0, 1, 2))
        assert (df["loss_pct"] >= -30).all()  # eps can also merge variants
        assert df.iloc[0]["loss_pct"] == 0.0
        assert (df["n_patterns"] > 0).all()


class TestQualitative:
    def test_all_expected_patterns_found(self):
        df = table08_qualitative()
        assert df["found"].all()
        for _, row in df.iterrows():
            got = set(row["months"].split(","))
            expected = set(row["expected_months"].split(","))
            # seasons must cover the expected months (boundary spill of one
            # adjacent month is tolerated, as windows are day-anchored)
            assert expected <= got
            assert len(got - expected) <= 2

    def test_month_mapping(self):
        assert month_of(0) == "Jan"
        assert month_of(334) == "Dec"
        assert month_of(364) == "Dec"
        assert month_of(365) == "Jan"  # wraps
        assert season_months([0, 1, 31]) == ["Jan", "Feb"]


class TestRuntimeShapes:
    def test_comparison_ordering(self):
        """The paper's headline: A-STPM fastest, baseline slowest."""
        df = runtime_comparison("inf", repeats=2).set_index("method")
        assert df.loc["E-STPM", "seconds"] < df.loc["APS-growth", "seconds"]
        assert df.loc["A-STPM", "seconds"] < df.loc["APS-growth", "seconds"]

    def test_ablation_all_fastest_noprune_slowest(self):
        df = pruning_ablation("inf").set_index("variant")
        assert df.loc["All", "seconds"] < df.loc["NoPrune", "seconds"]
        # all variants agree on the result set (pruning is lossless)
        assert df["n_patterns"].nunique() == 1


@pytest.mark.spark
class TestSparkPaths:
    def test_table05_spark_matches_pure(self, spark):
        pure = table05_characteristics().set_index("dataset")
        via_spark = table05_characteristics(spark).set_index("dataset")
        for ds in ("re", "inf"):
            assert via_spark.loc[ds, "n_series"] == pure.loc[ds, "n_series"]
            # value-noise at the symbolization cut may add/drop rare events
            assert abs(int(via_spark.loc[ds, "n_events"]) - int(pure.loc[ds, "n_events"])) <= 2

    def test_pattern_count_spark_matches_pure(self, spark):
        pure = pattern_count_table(
            "inf", max_periods=(0.4,), min_seasons=(8,), min_densities=(0.75,)
        )
        dist = pattern_count_table(
            "inf", max_periods=(0.4,), min_seasons=(8,), min_densities=(0.75,),
            spark=spark, n_groups=1,
        )
        assert pure.iloc[0]["8-0.75"] == dist.iloc[0]["8-0.75"]
