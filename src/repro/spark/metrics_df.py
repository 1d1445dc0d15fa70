"""Reconstruction metrics as Spark SQL joins (paper §6.2 measures).

Relative Hamming gain and recall compare the biadjacency matrix B
against B̃ = L ∘ R. Neither matrix is ever materialized densely: B is
the edge list, and B̃'s non-zero cells are the union of rectangles
Ũ_i × Ṽ_i, produced by joining the left-membership table with the
right-cluster table and deduplicating. The quantities

    ones   = |{B = 1}|             (edge count)
    tp     = |{B = 1 ∧ B̃ = 1}|    (edges ∩ reconstructed cells)
    fp     = |{B = 0 ∧ B̃ = 1}|    (reconstructed cells − edges)
    errors = (ones − tp) + fp      (symmetric difference)

give gain = 1 − errors/ones and recall = tp/ones — exactly the paper's
definitions. Every aggregate is plain relational algebra, so the tests
oracle-check these against DuckDB SQL on the same inputs.
"""
from __future__ import annotations

from dataclasses import dataclass

import pyspark.sql.functions as F
from pyspark.sql import DataFrame


@dataclass
class SparkReconstruction:
    ones: int
    true_positives: int
    false_positives: int

    @property
    def errors(self) -> int:
        return (self.ones - self.true_positives) + self.false_positives

    @property
    def relative_hamming_gain(self) -> float:
        return 1.0 - self.errors / self.ones if self.ones else 0.0

    @property
    def recall(self) -> float:
        return self.true_positives / self.ones if self.ones else 0.0


def reconstructed_cells_df(membership_df: DataFrame, clusters_df: DataFrame) -> DataFrame:
    """Distinct non-zero cells (u, v) of B̃ = L ∘ R: the Boolean matrix
    product is exactly 'u and v share at least one cluster'."""
    return (
        membership_df.select("u", "cluster")
        .join(clusters_df, "cluster")
        .select("u", "v")
        .distinct()
    )


def reconstruction_metrics_df(
    edges_df: DataFrame, membership_df: DataFrame, clusters_df: DataFrame
) -> SparkReconstruction:
    """Compute gain/recall counters with three aggregates over joins."""
    cells = reconstructed_cells_df(membership_df, clusters_df)
    edges = edges_df.select("u", "v").distinct()
    ones = edges.count()
    tp = edges.join(cells, ["u", "v"]).count()
    fp = cells.join(edges, ["u", "v"], "left_anti").count()
    return SparkReconstruction(ones=ones, true_positives=tp, false_positives=fp)


def metrics_summary_df(
    edges_df: DataFrame, membership_df: DataFrame, clusters_df: DataFrame
) -> DataFrame:
    """Single-row DataFrame (ones, tp, fp, gain, recall) — the oracle-
    checkable form used by tests (one Catalyst plan, one collect)."""
    cells = reconstructed_cells_df(membership_df, clusters_df)
    edges = edges_df.select("u", "v").distinct()
    both = edges.withColumn("in_b", F.lit(1)).join(
        cells.withColumn("in_bt", F.lit(1)), ["u", "v"], "full_outer"
    )
    return both.agg(
        F.sum(F.coalesce("in_b", F.lit(0))).alias("ones"),
        F.sum(
            F.coalesce("in_b", F.lit(0)) * F.coalesce("in_bt", F.lit(0))
        ).alias("tp"),
        F.sum(
            (F.lit(1) - F.coalesce("in_b", F.lit(0))) * F.coalesce("in_bt", F.lit(0))
        ).alias("fp"),
    )
