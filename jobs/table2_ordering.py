"""Reproduce Table 2: time to generate the truss-based edge ordering vs
the degeneracy vertex ordering on the four default datasets."""
import _common

from repro.experiments import format_rows, table2_rows


def main() -> None:
    _common.emit("Table 2 — ordering generation time (sec)", format_rows(table2_rows()))


if __name__ == "__main__":
    main()
