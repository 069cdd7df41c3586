"""Experiment 8 (Fig. 11): space costs — pickled broadcast-structure
size per algorithm, next to the raw edge-array size of the graph."""
import _common

from repro.experiments import exp8_rows, format_rows

COLUMNS = ["dataset", "algo", "bytes", "graph_bytes"]


def main() -> None:
    _common.emit("Experiment 8 — space costs", format_rows(exp8_rows(), COLUMNS))


if __name__ == "__main__":
    main()
