"""Table 2: relative Hamming gain per (k, algorithm, dataset).

Run: ``spark-submit jobs/table2_hamming_gain.py``. Shares the cached
full-grid sweep with tables 3-5 (results/cells.json).
"""
import _common  # noqa: F401
import os

from repro.eval.tables import render_metric_table, run_full_grid, write_table


def main() -> None:
    spark = _common.get_spark()
    cells = run_full_grid(spark)
    body = render_metric_table(cells, "gain")
    write_table(
        os.path.join(_common.RESULTS_DIR, "table2.md"),
        "Table 2 — relative Hamming gain",
        body,
    )
    spark.stop()


if __name__ == "__main__":
    main()
