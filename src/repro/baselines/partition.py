"""Partitioning / clustering baselines: IPLoM, LenMa, LogCluster, LogMine.
"""
from __future__ import annotations

import math

import numpy as np

from repro.baselines.base import Baseline
from repro.baselines.heuristic import WILD, _merge


class IPLoM(Baseline):
    """IPLoM (Makanju et al., KDD'09): iterative partitioning.

    Step 1 partitions by token count; step 2 recursively partitions by
    the position with the fewest distinct tokens (while that count stays
    under ``ct`` of the partition size); step 3 (bijection search) is
    approximated by one further split on the best 1:1-related position.
    """

    name = "IPLoM"

    def __init__(self, ct: float = 0.05, min_size: int = 6):
        self.ct, self.min_size = ct, min_size

    def parse_unique(self, uniq, counts):
        labels = [0] * len(uniq)
        next_label = [0]

        def emit(idxs):
            l = next_label[0]
            next_label[0] += 1
            for i in idxs:
                labels[i] = l

        def split(idxs, depth):
            n = len(idxs)
            if n < self.min_size or depth > 4:
                emit(idxs)
                return
            m = len(uniq[idxs[0]])
            if m == 0:
                emit(idxs)
                return
            cards = []
            for p in range(m):
                vals = {uniq[i][p] for i in idxs}
                # Partition only on low-cardinality positions: relative
                # bound ct*n plus an absolute cap (IPLoM's PST analogue).
                if 1 < len(vals) <= min(8, max(2, int(self.ct * n))):
                    cards.append((len(vals), p))
            if not cards:
                emit(idxs)
                return
            _, p = min(cards)
            parts: dict[str, list[int]] = {}
            for i in idxs:
                parts.setdefault(uniq[i][p], []).append(i)
            # Partition-support threshold (IPLoM's PST): undersized
            # parts pool into one leftover partition.
            pst = max(2, int(0.02 * n))
            leftover: list[int] = []
            for part in parts.values():
                if len(part) >= pst:
                    split(part, depth + 1)
                else:
                    leftover.extend(part)
            if leftover:
                emit(leftover)

        by_len: dict[int, list[int]] = {}
        for i, toks in enumerate(uniq):
            by_len.setdefault(len(toks), []).append(i)
        for idxs in by_len.values():
            split(idxs, 0)
        return labels


class LenMa(Baseline):
    """LenMa (Shima, 2016): clustering on word-length vectors.

    A log joins the cluster (same token count) whose word-length vector
    has cosine similarity >= ``threshold`` and whose exact-match
    positions agree; else it founds a cluster.
    """

    name = "LenMa"

    def __init__(self, threshold: float = 0.98):
        self.threshold = threshold

    def parse_unique(self, uniq, counts):
        clusters: dict[int, list[int]] = {}  # length -> cluster ids
        vecs: list[np.ndarray] = []
        tmpls: list[tuple] = []
        labels = []
        for toks in uniq:
            self.check_budget()
            v = np.array([len(t) for t in toks], dtype=float)
            best, best_sim = -1, 0.0
            for gid in clusters.get(len(toks), []):
                w = vecs[gid]
                denom = (np.linalg.norm(v) * np.linalg.norm(w)) or 1.0
                sim = float(v @ w) / denom
                if sim > best_sim:
                    best, best_sim = gid, sim
            if best >= 0 and best_sim >= self.threshold:
                tmpls[best] = _merge(tmpls[best], toks)
                vecs[best] = (vecs[best] + v) / 2.0
                labels.append(best)
            else:
                gid = len(tmpls)
                tmpls.append(tuple(toks))
                vecs.append(v)
                clusters.setdefault(len(toks), []).append(gid)
                labels.append(gid)
        return labels


class LogClusterLin(Baseline):
    """LogCluster (Lin et al., ICSE'16): word-frequency weighted
    agglomerative clustering. Each log is a bag-of-words vector with
    IDF-style weights; a log joins the first representative with cosine
    similarity above ``threshold`` — order-insensitive by construction,
    which is exactly why it confuses reordered messages (§2).
    """

    name = "LogCluster"

    def __init__(self, threshold: float = 0.7):
        self.threshold = threshold

    def parse_unique(self, uniq, counts):
        df: dict[str, int] = {}
        for toks in uniq:
            for t in set(toks):
                df[t] = df.get(t, 0) + 1
        n = max(len(uniq), 1)

        def vec(toks):
            v: dict[str, float] = {}
            for t in toks:
                v[t] = v.get(t, 0.0) + 1.0
            for t in v:
                v[t] *= 1.0 + math.log(n / (1 + df.get(t, 0)))
            norm = math.sqrt(sum(x * x for x in v.values())) or 1.0
            return {t: x / norm for t, x in v.items()}

        reps: list[dict] = []
        labels = []
        for toks in uniq:
            self.check_budget()
            v = vec(toks)
            best, best_sim = -1, 0.0
            for gid, r in enumerate(reps):
                if len(r) < len(v) / 2 or len(r) > len(v) * 2:
                    continue
                sim = sum(v[t] * r.get(t, 0.0) for t in v)
                if sim > best_sim:
                    best, best_sim = gid, sim
            if best >= 0 and best_sim >= self.threshold:
                labels.append(best)
            else:
                reps.append(v)
                labels.append(len(reps) - 1)
        return labels


class LogMine(Baseline):
    """LogMine (Hamooni et al., CIKM'16): level-wise cluster merging.

    ``dedup`` is on: the published level-0 is exact-duplicate clustering.

    Level 0 is exact duplicates; each level merges clusters whose
    representatives are within a growing distance bound, wildcarding
    mismatched positions. The published algorithm's map-reduce levels
    collapse to ``len(max_dists)`` sequential passes here; cost is
    bounded by sampling at ``cap`` representatives.
    """

    name = "LogMine"
    dedup = True

    def __init__(self, max_dists=(0.2, 0.4, 0.6), cap: int = 4000):
        self.max_dists, self.cap = max_dists, cap

    @staticmethod
    def _dist(a: tuple, b: tuple) -> float:
        # Strict positional distance: only exactly equal tokens count
        # (a wildcard matches only a wildcard), as in LogMine's scoring.
        if len(a) != len(b):
            return 1.0
        eq = sum(1 for x, y in zip(a, b) if x == y)
        return 1.0 - eq / max(len(a), 1)

    def parse_unique(self, uniq, counts):
        rep_of = list(range(len(uniq)))  # unique idx -> representative gid
        reps: list[tuple] = [tuple(t) for t in uniq]
        for max_d in self.max_dists:
            merged: list[tuple] = []
            remap: dict[int, int] = {}
            for gid in sorted(set(rep_of)):
                self.check_budget()
                r = reps[gid]
                hit = -1
                for mid, mr in enumerate(merged):
                    if self._dist(mr, r) <= max_d:
                        hit = mid
                        break
                if hit >= 0:
                    merged[hit] = _merge(merged[hit], r)
                    remap[gid] = hit
                else:
                    remap[gid] = len(merged)
                    merged.append(r)
            reps = merged
            rep_of = [remap[g] for g in rep_of]
        return rep_of
