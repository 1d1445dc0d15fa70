"""Table 5: accounted memory (MB) per (k, algorithm, dataset).

Memory is deterministic algorithm-state accounting, not RSS — see
repro/eval/memory.py. basso's out-of-budget cells print as the paper's
"—" (the workspace estimate that tripped the budget is in the cache).
Shares the cached sweep with tables 2/3/4.
"""
import _common  # noqa: F401
import os

from repro.eval.tables import render_metric_table, run_full_grid, write_table


def main() -> None:
    spark = _common.get_spark()
    cells = run_full_grid(spark)
    body = render_metric_table(
        cells, "memory_bytes", fmt=lambda v: f"{v / 2**20:.2f}"
    )
    write_table(
        os.path.join(_common.RESULTS_DIR, "table5.md"),
        "Table 5 — memory (MB, algorithm-state accounting)",
        body,
    )
    spark.stop()


if __name__ == "__main__":
    main()
