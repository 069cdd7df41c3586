"""Experiment 7 (Fig. 10): parallel schemes over the Spark engine —
EBBkC+ET (edge units) vs VBBkC+ET with EP and NP units, varying the
number of tasks."""
import _common

from repro.experiments import exp7_rows, format_rows

COLUMNS = ["dataset", "k", "algo", "n_tasks", "seconds", "count"]


def main() -> None:
    spark = _common.get_spark()
    _common.emit(
        "Experiment 7 — parallel schemes", format_rows(exp7_rows(spark), COLUMNS)
    )
    spark.stop()


if __name__ == "__main__":
    main()
