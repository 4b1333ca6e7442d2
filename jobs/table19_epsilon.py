"""Tables XIX/XX: tolerance-buffer (epsilon) sensitivity."""
from _common import emit


def main() -> None:
    from repro.experiments.tables import epsilon_table

    emit(epsilon_table(), "table19_epsilon")


if __name__ == "__main__":
    main()
