"""Hierarchical Navigable Small World graph (Malkov & Yashunin 2016).

Used as the coarse-quantizer accelerator of IVFPQ-HNSW (paper §7.1.2 (6):
"using HNSW to do the cluster assignment and management for the inverted
index"), and tested standalone. Similarity is inner product (max), matching
the normalized-cosine setting of the evaluation.
"""
from __future__ import annotations

import heapq
import math

import numpy as np


class HNSW:
    """A small, readable HNSW over a fixed set of vectors."""

    def __init__(self, m: int = 16, ef_construction: int = 64, seed: int = 0):
        if m < 2:
            raise ValueError("M must be >= 2")
        self.m = m
        self.ef_construction = max(ef_construction, m)
        self.seed = seed
        self.vectors: np.ndarray | None = None
        self.levels: np.ndarray | None = None
        self.layers: list[list[list[int]]] = []  # layers[l][node] -> neighbor list
        self.entry: int = -1
        self.max_level: int = -1

    # ------------------------------------------------------------------ build
    def fit(self, x: np.ndarray) -> "HNSW":
        x = np.ascontiguousarray(x, dtype=np.float32)
        n = x.shape[0]
        if n == 0:
            raise ValueError("cannot build HNSW over an empty set")
        self.vectors = x
        g = np.random.default_rng(self.seed)
        ml = 1.0 / math.log(self.m)
        self.levels = np.floor(-np.log(g.random(n) + 1e-12) * ml).astype(np.int64)
        self.max_level = int(self.levels.max())
        self.layers = [
            [[] for _ in range(n)] for _ in range(self.max_level + 1)
        ]
        self.entry = int(np.argmax(self.levels))
        for node in range(n):
            if node == self.entry:
                continue
            self._insert(node)
        return self

    def _sim(self, node: int, q: np.ndarray) -> float:
        return float(self.vectors[node] @ q)

    def _insert(self, node: int) -> None:
        q = self.vectors[node]
        level = int(self.levels[node])
        ep = self.entry
        # Greedy descent through layers above the node's level.
        for l in range(self.max_level, level, -1):
            ep = self._greedy(ep, q, l)
        for l in range(min(level, self.max_level), -1, -1):
            cands = self._search_layer(ep, q, self.ef_construction, l)
            ranked = sorted(cands, reverse=True)
            neighbors = self._select_heuristic([nid for _, nid in ranked], q)
            max_deg = 2 * self.m if l == 0 else self.m  # M_max0 = 2M, as in the paper
            for nid in neighbors:
                self.layers[l][node].append(nid)
                self.layers[l][nid].append(node)
                if len(self.layers[l][nid]) > max_deg:
                    ordered = sorted(
                        self.layers[l][nid],
                        key=lambda x2: self._sim(x2, self.vectors[nid]),
                        reverse=True,
                    )
                    self.layers[l][nid] = self._select_heuristic(
                        ordered, self.vectors[nid], limit=max_deg
                    )
            if cands:
                ep = max(cands)[1]

    def _select_heuristic(self, ranked: list[int], q: np.ndarray, limit: int | None = None) -> list[int]:
        """Malkov & Yashunin's diverse-neighbor selection: keep a candidate
        only if it is closer to q than to every already-kept neighbor —
        preserving long-range links so the graph stays navigable."""
        limit = limit or self.m
        kept: list[int] = []
        for e in ranked:
            if len(kept) >= limit:
                break
            sim_eq = self._sim(e, q)
            if all(float(self.vectors[e] @ self.vectors[r]) <= sim_eq for r in kept):
                kept.append(e)
        # Back-fill with nearest remaining so low-degree nodes keep links.
        for e in ranked:
            if len(kept) >= limit:
                break
            if e not in kept:
                kept.append(e)
        return kept

    def _greedy(self, ep: int, q: np.ndarray, layer: int) -> int:
        """Follow best-neighbor links until no improvement."""
        cur, cur_sim = ep, self._sim(ep, q)
        improved = True
        while improved:
            improved = False
            for nb in self.layers[layer][cur]:
                s = self._sim(nb, q)
                if s > cur_sim:
                    cur, cur_sim, improved = nb, s, True
        return cur

    def _search_layer(self, ep: int, q: np.ndarray, ef: int, layer: int) -> list:
        """Beam search on one layer → list of (sim, node), unsorted."""
        visited = {ep}
        ep_sim = self._sim(ep, q)
        candidates = [(-ep_sim, ep)]  # max-heap by sim (negated)
        best: list = [(ep_sim, ep)]  # min-heap of the ef best
        while candidates:
            neg_sim, node = heapq.heappop(candidates)
            if -neg_sim < best[0][0] and len(best) >= ef:
                break
            for nb in self.layers[layer][node]:
                if nb in visited:
                    continue
                visited.add(nb)
                s = self._sim(nb, q)
                if len(best) < ef or s > best[0][0]:
                    heapq.heappush(candidates, (-s, nb))
                    heapq.heappush(best, (s, nb))
                    if len(best) > ef:
                        heapq.heappop(best)
        return best

    # ----------------------------------------------------------------- search
    def search(self, q: np.ndarray, k: int, ef: int | None = None) -> np.ndarray:
        """Top-k node indices by inner product, best first."""
        if self.vectors is None:
            raise RuntimeError("search before fit")
        q = np.asarray(q, dtype=np.float32)
        ef = max(ef or self.ef_construction, k)
        ep = self.entry
        for l in range(self.max_level, 0, -1):
            ep = self._greedy(ep, q, l)
        best = self._search_layer(ep, q, ef, 0)
        top = sorted(best, reverse=True)[:k]
        return np.array([nid for _, nid in top], dtype=np.int64)

    @property
    def nbytes(self) -> int:
        links = sum(len(nb) for layer in self.layers for nb in layer)
        return links * 8 + self.levels.nbytes
