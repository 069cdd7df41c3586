"""Experiment 9 (Fig. 12): scalability — the three largest substitutes
under the EP scheme at maximum parallelism, EBBkC+ET vs BitCol."""
import _common

from repro.experiments import exp9_rows, format_rows

COLUMNS = ["dataset", "k", "algo", "n_tasks", "seconds", "count"]


def main() -> None:
    spark = _common.get_spark()
    _common.emit(
        "Experiment 9 — scalability", format_rows(exp9_rows(spark), COLUMNS)
    )
    spark.stop()


if __name__ == "__main__":
    main()
