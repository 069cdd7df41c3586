"""Reproduce Table 1: dataset statistics (ours vs paper) for all 19
substitute graphs."""
import _common

from repro.graph.stats import format_table1, table1_rows


def main() -> None:
    rows = table1_rows()
    _common.emit("Table 1 — dataset statistics (substitutes vs paper)", format_table1(rows))


if __name__ == "__main__":
    main()
