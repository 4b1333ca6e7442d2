"""Figs. 15-16 shape: E-STPM pruning variants (NoPrune/Apriori/Trans/All)."""
from _common import emit


def main() -> None:
    from repro.experiments.tables import pruning_ablation

    for ds in ("re", "inf"):
        emit(pruning_ablation(ds), f"fig_pruning_{ds}")


if __name__ == "__main__":
    main()
