"""Table 4: run-time in seconds per (k, algorithm, dataset).

Paper reports CPU minutes on an i7-3770; we report wall seconds on the
container — only ratios are comparable (EXPERIMENTS.md). Shares the
cached sweep with tables 2/3/5.
"""
import _common  # noqa: F401
import os

from repro.eval.tables import render_metric_table, run_full_grid, write_table


def main() -> None:
    spark = _common.get_spark()
    cells = run_full_grid(spark)
    body = render_metric_table(cells, "seconds", fmt=lambda v: f"{v:.1f}")
    write_table(
        os.path.join(_common.RESULTS_DIR, "table4.md"),
        "Table 4 — run-time (wall seconds)",
        body,
    )
    spark.stop()


if __name__ == "__main__":
    main()
