"""Static→streaming reduction (paper §5.5): RSdhillon / RSzhaEtAl.

First pass: reservoir-sample m̃ left vertices from the stream; let V' be
their neighbors and V'' the ñ highest-degree vertices of V' (degree
within the sampled subgraph). Run a static co-clustering algorithm on
the m̃ × ñ subgraph to get right clusters over V''; attach each
remaining v ∈ V' \\ V'' to the cluster whose *average left-neighborhood*
vector is closest (L1) to v's own neighborhood vector over the sample.

Second pass: exactly SOFA's §4 algorithms, shared via
``repro.core.second_pass`` — the reduction only supplies right clusters.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, List, Sequence

import numpy as np

from .spectral import SpectralResult, dhillon_cocluster, zha_cocluster


def reservoir_sample_indices(m: int, m_tilde: int, *, seed: int = 0) -> np.ndarray:
    """Classic one-pass reservoir sampling of m̃ indices out of a stream
    of length m; returned in stream order (sorted)."""
    g = np.random.default_rng(seed)
    if m <= m_tilde:
        return np.arange(m, dtype=np.int64)
    res = np.arange(m_tilde, dtype=np.int64)
    for i in range(m_tilde, m):
        j = int(g.integers(0, i + 1))
        if j < m_tilde:
            res[j] = i
    return np.sort(res)


@dataclass
class ReductionResult:
    right_clusters: List[np.ndarray]   # global right-vertex ids per cluster
    sampled_left: np.ndarray           # the reservoir U'
    workspace_bytes: int


def _subgraph_matrix(
    adj: Sequence[np.ndarray], sample: np.ndarray, cols: np.ndarray
) -> np.ndarray:
    col_pos = {int(v): j for j, v in enumerate(cols)}
    B = np.zeros((len(sample), len(cols)), dtype=np.float32)
    for i, u in enumerate(sample):
        for v in adj[int(u)]:
            j = col_pos.get(int(v))
            if j is not None:
                B[i, j] = 1.0
    return B


def random_subgraph_clusters(
    adj: Sequence[np.ndarray],
    k: int,
    *,
    m_tilde: int,
    n_tilde: int,
    method: Callable[[np.ndarray, int], SpectralResult],
    seed: int = 0,
) -> ReductionResult:
    """Run the full §5.5 first pass with the given static co-clustering
    ``method`` (e.g. :func:`dhillon_cocluster`)."""
    sample = reservoir_sample_indices(len(adj), m_tilde, seed=seed)
    # V' with in-sample degrees
    deg: dict[int, int] = {}
    for u in sample:
        for v in adj[int(u)]:
            deg[int(v)] = deg.get(int(v), 0) + 1
    vprime = np.asarray(sorted(deg), dtype=np.int64)
    # V'' = top-ñ by in-sample degree (ties: lower id, deterministic)
    order = sorted(deg, key=lambda v: (-deg[v], v))
    vpp = np.asarray(sorted(order[:n_tilde]), dtype=np.int64)

    B = _subgraph_matrix(adj, sample, vpp)
    res = method(B, k)
    clusters: List[List[int]] = [[] for _ in range(k)]
    for local, lab in enumerate(res.col_labels):
        if 0 <= lab < k:
            clusters[int(lab)].append(int(vpp[local]))

    # attach low-degree leftovers V' \ V'' by average-neighborhood distance
    leftovers = np.setdiff1d(vprime, vpp, assume_unique=True)
    if len(leftovers) and any(clusters):
        # average left-neighborhood per cluster, over the sample's rows
        col_of = {int(v): j for j, v in enumerate(vpp)}
        avg = np.zeros((k, len(sample)), dtype=np.float64)
        cnt = np.zeros(k, dtype=np.int64)
        for ci, mem in enumerate(clusters):
            for v in mem:
                avg[ci] += B[:, col_of[v]]
                cnt[ci] += 1
        nonempty = cnt > 0
        avg[nonempty] /= cnt[nonempty][:, None]
        # neighborhood vectors of the leftovers over the sample, built by
        # one sweep over the sampled adjacency (not per-leftover scans)
        leftover_pos = {int(v): j for j, v in enumerate(leftovers)}
        XV = np.zeros((len(leftovers), len(sample)), dtype=np.float64)
        for i, u in enumerate(sample):
            for v in adj[int(u)]:
                j = leftover_pos.get(int(v))
                if j is not None:
                    XV[j, i] = 1.0
        # L1 distance of binary x to real a: sum(a) + deg(x) - 2 x·a
        dists = (
            avg.sum(axis=1)[None, :]
            + XV.sum(axis=1)[:, None]
            - 2.0 * (XV @ avg.T)
        )
        dists[:, ~nonempty] = np.inf
        for j, v in enumerate(leftovers):
            clusters[int(np.argmin(dists[j]))].append(int(v))

    ws = int(res.workspace_bytes + B.nbytes + 8 * k * len(sample))
    return ReductionResult(
        right_clusters=[np.asarray(sorted(c), dtype=np.int64) for c in clusters],
        sampled_left=sample,
        workspace_bytes=ws,
    )


def rs_dhillon(adj, k, *, m_tilde, n_tilde, seed=0) -> ReductionResult:
    return random_subgraph_clusters(
        adj, k, m_tilde=m_tilde, n_tilde=n_tilde,
        method=lambda B, kk: dhillon_cocluster(B, kk, seed=seed), seed=seed,
    )


def rs_zha(adj, k, *, m_tilde, n_tilde, seed=0) -> ReductionResult:
    return random_subgraph_clusters(
        adj, k, m_tilde=m_tilde, n_tilde=n_tilde,
        method=lambda B, kk: zha_cocluster(B, kk, seed=seed), seed=seed,
    )
