"""Experiment 2 (Fig. 5): EBBkC+ET vs VBBkC baselines on the large-ω
substitutes — small k plus k near ω."""
import _common

from repro.experiments import exp2_rows, format_rows

COLUMNS = ["dataset", "k", "algo", "seconds", "count"]


def main() -> None:
    _common.emit(
        "Experiment 2 — large-ω comparison (small k + near-ω k)",
        format_rows(exp2_rows(), COLUMNS),
    )


if __name__ == "__main__":
    main()
