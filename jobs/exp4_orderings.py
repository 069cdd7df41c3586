"""Experiment 4 (Fig. 7): effect of the edge ordering — EBBkC-T vs
EBBkC-C vs EBBkC-H (all with pruning rules and ET)."""
import _common

from repro.experiments import exp4_rows, format_rows

COLUMNS = ["dataset", "k", "algo", "seconds", "count"]


def main() -> None:
    _common.emit("Experiment 4 — edge orderings", format_rows(exp4_rows(), COLUMNS))


if __name__ == "__main__":
    main()
