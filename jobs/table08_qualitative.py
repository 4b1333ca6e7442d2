"""Table VIII: named qualitative seasonal patterns with their months."""
from _common import emit


def main() -> None:
    from repro.experiments.qualitative import table08_qualitative

    emit(table08_qualitative(), "table08_qualitative")


if __name__ == "__main__":
    main()
