"""Table IX: number of seasonal patterns on RE (per-group Spark mining)."""
from _common import emit, get_spark


def main() -> None:
    from repro.experiments.tables import pattern_count_table

    spark = get_spark("table09")
    emit(pattern_count_table("re", spark=spark), "table09_patterns_re")
    spark.stop()


if __name__ == "__main__":
    main()
