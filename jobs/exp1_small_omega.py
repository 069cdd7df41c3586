"""Experiment 1 (Fig. 4): EBBkC+ET vs VBBkC baselines on the small-ω
substitutes, sweeping k from 4 to ω."""
import _common

from repro.experiments import exp1_rows, format_rows

COLUMNS = ["dataset", "k", "algo", "seconds", "count"]


def main() -> None:
    _common.emit(
        "Experiment 1 — small-ω comparison (k = 4..ω)",
        format_rows(exp1_rows(), COLUMNS),
    )


if __name__ == "__main__":
    main()
