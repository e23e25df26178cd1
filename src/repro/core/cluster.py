"""Hierarchical clustering (§4.3) and the single clustering process (§4.4).

One *single clustering process* splits a node's unique logs into ≥2
clusters with a K-Means-like loop over the Eq.-2 positional similarity:
K-Means++-style seeding (random first centre, farthest log second),
iterative reassignment with balanced tie-breaking (§4.6), and cluster
injection whenever a converged cluster fails to improve the parent's
saturation (§4.4 "ensure saturation increase"). Early-stop shortcuts
(§4.7) skip the loop entirely for trivial nodes.

For speed the kernel factorizes the group's hash matrix once into
per-column integer codes: Eq.-2 frequencies reduce to ``bincount`` over
the code vocabulary, and the saturation statistics operate on the code
matrix directly (hashes and codes give identical distinctness-based
results, asserted in tests).

``build_tree`` applies the process recursively until every node reaches
the saturation target, producing the template tree rows that
``ParserModel`` assembles.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.config import ClusterConfig
from repro.core.distance import similarity_matrix_codes
from repro.core.saturation import node_stats, resolved_masks, saturation

_EPS = 1e-12


def factorize(mat: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Hash matrix -> (codes, vocab): per-column dense integer codes."""
    n, m = mat.shape
    codes = np.empty((n, m), dtype=np.int32)
    vocab = np.empty(m, dtype=np.int64)
    for i in range(m):
        vals, inv = np.unique(mat[:, i], return_inverse=True)
        codes[:, i] = inv
        vocab[i] = len(vals)
    return codes, vocab




def _assign(sims: np.ndarray, rng: np.random.Generator, balanced: bool) -> np.ndarray:
    """Cluster index per log: argmax similarity, ties broken uniformly
    at random when ``balanced`` (§4.6), else first-cluster-wins."""
    mx = sims.max(axis=1, keepdims=True)
    ties = sims >= mx - _EPS
    if not balanced:
        return ties.argmax(axis=1)
    noise = rng.random(sims.shape)
    return np.where(ties, noise, -1.0).argmax(axis=1)


def _early_split(
    codes: np.ndarray,
    vocab: np.ndarray,
    rows: np.ndarray,
    counts: np.ndarray,
    cfg: ClusterConfig,
) -> list[np.ndarray] | None:
    """§4.7 early stops, on node-relative indices. Returns a partition
    (list of relative row-index arrays) or None when the full clustering
    process is required."""
    n = len(rows)
    if n == 2:
        return [np.array([0]), np.array([1])]
    sub, cnt = codes[rows], counts[rows]
    stats = node_stats(sub, cnt)
    nu = stats[0]
    const, var = resolved_masks(sub, cfg, cnt, stats)
    unresolved = np.flatnonzero(~(const | var))
    if len(unresolved) == 1:
        # Single unresolved position: split directly by its values.
        # Children ordered by first row so the split is independent of
        # the hash function's value ordering.
        p = int(unresolved[0])
        vals, inv = np.unique(codes[rows, p], return_inverse=True)
        if len(vals) < 2:
            return None
        children = [np.flatnonzero(inv == j) for j in range(len(vals))]
        return sorted(children, key=lambda c: int(c[0]))
    if len(unresolved) > 1 and bool((nu[unresolved] >= n).all()):
        # Completely distinct unresolved positions: each log separate.
        return [np.array([i]) for i in range(n)]
    return None


def split_node(
    codes: np.ndarray,
    vocab: np.ndarray,
    counts: np.ndarray,
    rows: np.ndarray,
    parent_sat: float,
    cfg: ClusterConfig,
    rng: np.random.Generator,
) -> list[np.ndarray] | None:
    """One single clustering process on ``rows`` of the node.

    Returns the partition as absolute row-index arrays, or None when the
    node cannot (or need not) be split further.
    """
    n = len(rows)
    if n <= 1:
        return None
    if cfg.early_stop:
        early = _early_split(codes, vocab, rows, counts, cfg)
        if early is not None:
            return [rows[c] for c in early] if len(early) > 1 else None

    sub = codes[rows]
    cnt = counts[rows].astype(np.float64)

    def sims_for(clusters: list[np.ndarray]) -> np.ndarray:
        return similarity_matrix_codes(sub, vocab, counts[rows], clusters, cfg)

    # --- K-Means++-like seeding (§4.4) -------------------------------
    if cfg.kmeanspp:
        c0 = int(rng.choice(n, p=cnt / cnt.sum()))
        s0 = sims_for([np.array([c0])])[:, 0]
        s0[c0] = np.inf
        c1 = int(s0.argmin())
    else:
        c0, c1 = map(int, rng.choice(n, size=2, replace=False))
    clusters = [np.array([c0]), np.array([c1])]

    prev_assign: np.ndarray | None = None
    sims = sims_for(clusters)
    for _ in range(max(1, cfg.max_iters)):
        assign = _assign(sims, rng, cfg.balanced)
        clusters = [c for j in range(sims.shape[1]) if len(c := np.flatnonzero(assign == j))]
        if prev_assign is not None and np.array_equal(assign, prev_assign):
            if not cfg.ensure_sat_increase or len(clusters) >= min(n, cfg.max_clusters):
                break
            # Converged: inject a new cluster if some multi-log cluster
            # failed to improve on the parent's saturation (§4.4).
            bad = [
                c for c in clusters
                if len(c) > 1
                and saturation(codes[rows[c]], cfg, counts[rows[c]])
                <= parent_sat + _EPS
            ]
            if not bad:
                break
            pool = np.concatenate(bad)
            if cfg.kmeanspp:
                worst = pool[sims[pool].max(axis=1).argmin()]
            else:
                worst = rng.choice(pool)
            clusters.append(np.array([int(worst)]))
            prev_assign = None  # force another reassignment round
        else:
            prev_assign = assign
        sims = sims_for(clusters)
    if len(clusters) < 2:
        return None
    # Deterministic child order regardless of centroid history.
    return [rows[c] for c in sorted(clusters, key=lambda c: int(c[0]))]


@dataclass
class TreeRow:
    """One clustering-tree node produced by ``build_tree``."""

    idx: int
    parent: int  # -1 for the group root
    template: tuple[str, ...]
    saturation: float
    n_logs: int
    n_unique: int
    depth: int
    rows: np.ndarray  # unique-log indices (training assignment)


def build_tree(
    mat: np.ndarray,
    counts: np.ndarray,
    texts: list[tuple[str, ...]],
    cfg: ClusterConfig,
    rng: np.random.Generator,
    wildcard: str = "*",
) -> list[TreeRow]:
    """Hierarchically cluster one initial group into a template tree.

    ``mat``: (n_unique, m) hash matrix; ``counts``: duplicate count per
    unique log; ``texts``: token strings per unique log (for template
    rendering). Node saturations are clamped to be non-decreasing along
    root→leaf paths so query-time ancestor walks are well-defined.
    """
    codes, vocab = factorize(mat)
    out: list[TreeRow] = []
    all_rows = np.arange(mat.shape[0])
    stack: list[tuple[np.ndarray, int]] = [(all_rows, -1)]
    while stack:
        rows, parent = stack.pop()
        sub, cnt = codes[rows], counts[rows]
        nu = node_stats(sub, cnt)[0]
        sat = saturation(sub, cfg, cnt)
        if parent >= 0:
            sat = max(sat, out[parent].saturation)  # monotone down the tree
        first = texts[int(rows[0])]
        idx = len(out)
        out.append(
            TreeRow(
                idx=idx,
                parent=parent,
                template=tuple(
                    first[i] if nu[i] == 1 else wildcard for i in range(len(nu))
                ),
                saturation=float(sat),
                n_logs=int(counts[rows].sum()),
                n_unique=len(rows),
                depth=0 if parent < 0 else out[parent].depth + 1,
                rows=rows,
            )
        )
        if sat >= cfg.sat_target or len(rows) <= 1:
            continue
        children = split_node(codes, vocab, counts, rows, sat, cfg, rng)
        if children is None:
            continue
        for child in children:
            stack.append((child, idx))
    return out
