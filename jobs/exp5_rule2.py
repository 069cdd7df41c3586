"""Experiment 5 (Fig. 8/15): effect of the color-based pruning Rule (2)
— EBBkC+ET with vs without the rule (the paper's EBBkC(stc)+ET)."""
import _common

from repro.experiments import exp5_rows, format_rows

COLUMNS = ["dataset", "k", "algo", "seconds", "count"]


def main() -> None:
    _common.emit("Experiment 5 — pruning Rule (2)", format_rows(exp5_rows(), COLUMNS))


if __name__ == "__main__":
    main()
