"""Table 3: recall per (k, algorithm, dataset).

Run: ``spark-submit jobs/table3_recall.py``. Shares the cached sweep.
"""
import _common  # noqa: F401
import os

from repro.eval.tables import render_metric_table, run_full_grid, write_table


def main() -> None:
    spark = _common.get_spark()
    cells = run_full_grid(spark)
    body = render_metric_table(cells, "recall")
    write_table(
        os.path.join(_common.RESULTS_DIR, "table3.md"),
        "Table 3 — recall",
        body,
    )
    spark.stop()


if __name__ == "__main__":
    main()
