"""Table XI: % time series / events pruned by A-STPM at scale."""
from _common import emit


def main() -> None:
    from repro.experiments.tables import pruning_table

    for ds in ("re", "inf"):
        emit(pruning_table(ds), f"table11_pruning_{ds}")


if __name__ == "__main__":
    main()
