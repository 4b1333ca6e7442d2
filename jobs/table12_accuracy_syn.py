"""Table XII: A-STPM accuracy on the scaled synthetic datasets."""
from _common import emit


def main() -> None:
    from repro.experiments.tables import accuracy_synthetic_table

    for ds in ("re", "inf"):
        emit(accuracy_synthetic_table(ds), f"table12_accuracy_{ds}")


if __name__ == "__main__":
    main()
