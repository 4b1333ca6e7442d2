"""Table V: dataset characteristics via the full Spark Phase-1 path."""
from _common import emit, get_spark


def main() -> None:
    from repro.experiments.tables import table05_characteristics

    spark = get_spark("table05")
    emit(table05_characteristics(spark), "table05_characteristics")
    spark.stop()


if __name__ == "__main__":
    main()
