"""Clustering quality measure from paper §6.1.

Q = (1/k) * sum_i max_j J(U_i, Ũ_j), where J is the Jaccard coefficient
and the max runs over the returned clusters. Q ∈ [0, 1]; Q = 1 iff every
planted cluster is matched exactly by some returned cluster.
"""
from __future__ import annotations

from typing import Sequence

import numpy as np


def jaccard(a: Sequence[int], b: Sequence[int]) -> float:
    sa, sb = set(int(x) for x in a), set(int(x) for x in b)
    if not sa and not sb:
        return 1.0
    u = len(sa | sb)
    return len(sa & sb) / u if u else 0.0


def jaccard_quality(
    ground_truth: Sequence[Sequence[int]],
    returned: Sequence[Sequence[int]],
) -> float:
    """Average best-match Jaccard of ground-truth clusters vs returned."""
    if not ground_truth:
        return 1.0
    if not returned:
        return 0.0
    total = 0.0
    for gt in ground_truth:
        total += max(jaccard(gt, r) for r in returned)
    return total / len(ground_truth)


def labels_to_clusters(labels: Sequence[int]) -> list[np.ndarray]:
    """Convert a per-item label vector into member-index cluster lists."""
    labels = np.asarray(labels, dtype=np.int64)
    return [np.where(labels == l)[0] for l in np.unique(labels)]
