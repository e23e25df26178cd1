"""Search-based baselines: LogSig and MoLFI.

Both optimize a template objective by local/evolutionary search; both
are known to be unstable on large heterogeneous logs (§2, Table 3),
which their compact forms reproduce.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.base import Baseline
from repro.baselines.heuristic import WILD


class LogSig(Baseline):
    """LogSig (Tang et al., CIKM'11): k-group term-pair search.

    Requires the number of clusters ``k`` up front (the paper lists this
    as its key limitation; the harness passes the ground-truth count).
    Logs move between groups to maximize shared term-pair potential;
    ``iters`` local-search rounds from a seeded random start.
    """

    name = "LogSig"

    def __init__(self, k: int = 64, iters: int = 5, seed: int = 0, cap: int = 3000):
        self.k, self.iters, self.seed, self.cap = k, iters, seed, cap

    @staticmethod
    def _pairs(toks: tuple) -> set:
        return {(toks[i], toks[j]) for i in range(len(toks)) for j in range(i + 1, min(i + 4, len(toks)))}

    def parse_unique(self, uniq, counts):
        rng = np.random.default_rng(self.seed)
        n = len(uniq)
        k = min(self.k, max(n, 1))
        sample = list(range(n))
        if n > self.cap:
            sample = list(rng.choice(n, self.cap, replace=False))
        pair_sets = {i: self._pairs(uniq[i]) for i in sample}
        assign = {i: int(rng.integers(0, k)) for i in sample}
        for _ in range(self.iters):
            # Group term-pair histograms.
            hist: list[dict] = [dict() for _ in range(k)]
            size = [0] * k
            for i in sample:
                g = assign[i]
                size[g] += 1
                for p in pair_sets[i]:
                    hist[g][p] = hist[g].get(p, 0) + 1
            moved = 0
            for i in sample:
                self.check_budget()
                best, best_pot = assign[i], -1.0
                for g in range(k):
                    if not size[g] and g != assign[i]:
                        continue
                    denom = size[g] or 1
                    pot = sum((hist[g].get(p, 0) / denom) ** 2 for p in pair_sets[i])
                    if pot > best_pot:
                        best, best_pot = g, pot
                if best != assign[i]:
                    moved += 1
                    assign[i] = best
            if not moved:
                break
        # Non-sampled logs go to the group with maximal potential.
        hist = [dict() for _ in range(k)]
        size = [0] * k
        for i in sample:
            g = assign[i]
            size[g] += 1
            for p in pair_sets[i]:
                hist[g][p] = hist[g].get(p, 0) + 1
        labels = []
        for i in range(n):
            if i in assign:
                labels.append(assign[i])
                continue
            ps = self._pairs(uniq[i])
            best, best_pot = 0, -1.0
            for g in range(k):
                denom = size[g] or 1
                pot = sum((hist[g].get(p, 0) / denom) ** 2 for p in ps)
                if pot > best_pot:
                    best, best_pot = g, pot
            labels.append(best)
        return labels


class MoLFI(Baseline):
    """MoLFI (Messaoudi et al., ICPC'18): evolutionary template search.

    Per token count, a small population of wildcard masks over sampled
    logs evolves for ``generations`` rounds under the published
    two-objective fitness (frequency vs. specificity); each log maps to
    the best-matching evolved template, unmatched logs to a per-length
    catch-all.
    """

    name = "MoLFI"

    def __init__(self, pop: int = 12, generations: int = 8, seed: int = 0):
        self.pop, self.generations, self.seed = pop, generations, seed

    def parse_unique(self, uniq, counts):
        rng = np.random.default_rng(self.seed)
        by_len: dict[int, list[int]] = {}
        for i, toks in enumerate(uniq):
            by_len.setdefault(len(toks), []).append(i)
        labels = [0] * len(uniq)
        next_id = 0
        for m, idxs in by_len.items():
            rows = [uniq[i] for i in idxs]
            pop: list[tuple] = []
            for _ in range(min(self.pop, len(rows))):
                base = rows[int(rng.integers(0, len(rows)))]
                mask = rng.random(m) < 0.4
                pop.append(tuple(WILD if mask[p] else base[p] for p in range(m)))

            def fitness(t: tuple) -> float:
                matched = sum(
                    1 for r in rows if all(x == WILD or x == y for x, y in zip(t, r))
                )
                spec = sum(1 for x in t if x != WILD) / max(m, 1)
                return (matched / len(rows)) * spec

            for _ in range(self.generations):
                self.check_budget()
                scored = sorted(pop, key=fitness, reverse=True)[: max(2, self.pop // 2)]
                pop = list(scored)
                while len(pop) < self.pop:
                    a, b = scored[int(rng.integers(0, len(scored)))], scored[
                        int(rng.integers(0, len(scored)))
                    ]
                    cut = int(rng.integers(0, m + 1))
                    child = a[:cut] + b[cut:]
                    if rng.random() < 0.3 and m:
                        p = int(rng.integers(0, m))
                        src = rows[int(rng.integers(0, len(rows)))]
                        child = child[:p] + ((WILD,) if child[p] != WILD else (src[p],)) + child[p + 1:]
                    pop.append(child)
            final = sorted(set(pop), key=fitness, reverse=True)
            tmpl_ids = {t: next_id + j for j, t in enumerate(final)}
            catch_all = next_id + len(final)
            next_id = catch_all + 1
            for i in idxs:
                r = uniq[i]
                for t in final:
                    if all(x == WILD or x == y for x, y in zip(t, r)):
                        labels[i] = tmpl_ids[t]
                        break
                else:
                    labels[i] = catch_all
        return labels
