"""Experiment 6 (Fig. 9): early-termination threshold sweep, t ∈ {1..5}."""
import _common

from repro.experiments import exp6_rows, format_rows

COLUMNS = ["dataset", "k", "algo", "seconds", "count"]


def main() -> None:
    _common.emit("Experiment 6 — ET threshold t", format_rows(exp6_rows(), COLUMNS))


if __name__ == "__main__":
    main()
