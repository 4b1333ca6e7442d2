"""Table VII: A-STPM accuracy vs E-STPM on the RE/INF stand-ins."""
from _common import emit


def main() -> None:
    from repro.experiments.tables import accuracy_table

    for ds in ("re", "inf"):
        emit(accuracy_table(ds), f"table07_accuracy_{ds}")


if __name__ == "__main__":
    main()
