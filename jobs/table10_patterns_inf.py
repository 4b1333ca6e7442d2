"""Table X: number of seasonal patterns on INF (per-group Spark mining)."""
from _common import emit, get_spark


def main() -> None:
    from repro.experiments.tables import pattern_count_table

    spark = get_spark("table10")
    emit(pattern_count_table("inf", spark=spark), "table10_patterns_inf")
    spark.stop()


if __name__ == "__main__":
    main()
