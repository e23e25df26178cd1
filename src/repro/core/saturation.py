"""Saturation score (§4.5, Eq. 3).

Saturation measures how fully the token positions of a node's logs are
resolved into constants or variables, and it terminates hierarchical
clustering. Implementation notes (DESIGN.md §4):

* a position is resolved when all its tokens are identical (constant)
  or when it is a *likely variable*. Likely variables must (a) have ≥3
  distinct tokens, (b) be near-uniform in true (duplicate-weighted) log
  frequency — a template mixture is skewed by the Zipf law of template
  frequencies — and (c) be pairwise independent of every other
  candidate position: mixture "constants" are structurally correlated
  across positions (the paper's Fig.-5 Set-2 discussion), while genuine
  variables vary freely. A fully-distinct position over otherwise
  constant logs (Set 1) passes all three and yields saturation 1;
* resolved positions play the role of ``m_c`` in ``f_c`` and ``p_c``;
* ``f_v`` follows the printed formula, clamped into [0, 1].

All entry points take an ``(n, m)`` integer matrix for the node's
*unique* logs — raw 64-bit hashes or factorized codes give identical
results, since every statistic is distinctness/count based — plus the
optional duplicate multiplicities.
"""
from __future__ import annotations

import math

import numpy as np

from repro.core.config import ClusterConfig

#: multiplier for combining two code columns into pair keys; an odd
#: constant keeps the map injective-in-practice under int64 wraparound.
_PAIR_MIX = np.int64(-0x61C8864680B583EB)  # 0x9E3779B97F4A7C15 as signed


def node_stats(
    mat: np.ndarray, counts: np.ndarray | None = None
) -> tuple[np.ndarray, np.ndarray, float]:
    """Per-position (distinct count, top-value weighted count) plus the
    duplicate-weighted log total for a node matrix."""
    n, m = mat.shape
    w = np.ones(n) if counts is None else counts.astype(np.float64)
    nu = np.empty(m, dtype=np.int64)
    topc = np.empty(m, dtype=np.float64)
    for i in range(m):
        _, inv = np.unique(mat[:, i], return_inverse=True)
        per_val = np.bincount(inv, weights=w)
        nu[i] = len(per_val)
        topc[i] = per_val.max()
    return nu, topc, float(w.sum())


def distinct_counts(mat: np.ndarray) -> np.ndarray:
    """Distinct token count per position (length-m int array)."""
    return node_stats(mat)[0]


def _independent(mat: np.ndarray, nu: np.ndarray, cand: np.ndarray, beta: float) -> np.ndarray:
    """Pairwise-independence filter over candidate positions.

    Returns a boolean mask over ``cand``: a candidate survives only if,
    against every other candidate, the observed distinct-pair count
    reaches ``beta * min(n_unique, n_i * n_j)`` — correlated mixture
    columns produce far fewer distinct pairs than independent variables.
    """
    n = mat.shape[0]
    k = len(cand)
    ok = np.ones(k, dtype=bool)
    cols = [mat[:, int(i)].astype(np.int64) for i in cand]
    for a in range(k):
        for b in range(a + 1, k):
            d = len(np.unique(cols[a] * _PAIR_MIX + cols[b]))
            if d < beta * min(n, int(nu[cand[a]]) * int(nu[cand[b]])):
                ok[a] = ok[b] = False
    return ok


def resolved_masks(
    mat: np.ndarray,
    cfg: ClusterConfig,
    counts: np.ndarray | None = None,
    stats: tuple[np.ndarray, np.ndarray, float] | None = None,
) -> tuple[np.ndarray, np.ndarray]:
    """(constant_mask, likely_variable_mask) per position."""
    nu, topc, n_w = node_stats(mat, counts) if stats is None else stats
    const = nu == 1
    m = len(nu)
    if not cfg.variable_credit or n_w <= 1:
        return const, np.zeros(m, dtype=bool)
    bound = np.minimum(
        np.ceil(cfg.variable_uniformity * n_w / np.maximum(nu, 1)),
        np.maximum(1.0, cfg.variable_max_share * n_w),
    )
    # A binary position is indistinguishable from a two-template
    # mixture by these statistics, hence the >=3 floor.
    cand = np.flatnonzero((~const) & (nu >= 3) & (topc <= bound))
    var = np.zeros(m, dtype=bool)
    if len(cand):
        var[cand[_independent(mat, nu, cand, cfg.variable_independence)]] = True
    return const, var


def saturation(
    mat: np.ndarray, cfg: ClusterConfig, counts: np.ndarray | None = None
) -> float:
    """Eq. 3 with resolved-variable credit; 1.0 for singletons and for
    fully-resolved nodes, strictly below 1.0 otherwise."""
    n, m = mat.shape
    if n <= 1 or m == 0:
        return 1.0
    stats = node_stats(mat, counts)
    nu, _topc, n_w = stats
    const, var = resolved_masks(mat, cfg, counts, stats)
    m_r = int(const.sum() + var.sum())
    if m_r == m:
        return 1.0
    f_c = m_r / m
    if not cfg.variable_credit:
        # Ablation "w/o variable in saturation": s(C) = f_c.
        return f_c
    unresolved = ~(const | var)
    log_n = math.log(max(n_w, 2.0))
    f_v = min(
        min(max((math.log(int(u)) - 1.0) / log_n, 0.0), 1.0)
        for u in nu[unresolved]
    )
    if not cfg.confidence_factor:
        # Ablation "w/o confidence factor": s(C) = f_v * f_c.
        return f_v * f_c
    p_c = 1.0 / (2 * m - m_r - 1)
    return (f_v * p_c + (1.0 - p_c)) * f_c
