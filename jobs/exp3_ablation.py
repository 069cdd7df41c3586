"""Experiment 3 (Fig. 6/14): ablation — EBBkC+ET vs EBBkC vs DDegCol+
vs BitCol+ (Rule 2 added to the VBBkC SOTA, no SIMD)."""
import _common

from repro.experiments import exp3_rows, format_rows

COLUMNS = ["dataset", "k", "algo", "seconds", "count"]


def main() -> None:
    _common.emit("Experiment 3 — ablation", format_rows(exp3_rows(), COLUMNS))


if __name__ == "__main__":
    main()
