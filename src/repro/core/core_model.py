"""The core model — LIDER's basic indexing/search unit (paper §3.1, §3.3.1).

A core model combines:
  * ESK-LSH (H compound hashes → H sorted hashkey arrays),
  * a key re-scaling module per array,
  * one simplified RMI per array ("one RMI corresponds to one sorted array"),
  * candidate verification by exact cosine on the original embeddings.

Search (§3.3.1): query embedding → H query hashkeys → re-scaled RMI keys →
RMI-predicted locations → bi-directional expansion windows of width
R = r0·km on each array → union of candidates → exact scoring → top-km.

``expansion_seconds``/``expansion_count`` accumulate the time of steps
(1)+(3)+(4) (hashkey generation, prediction, expansion) for the Table-3
"average ESK-LSH expansion time" measurement.
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass, field

import numpy as np

from repro.lsh.esklsh import ESKLSH, SortedKeyArray
from repro.rmi.rescale import KeyRescaler
from repro.rmi.rmi import SimplifiedRMI


@dataclass
class CoreModelConfig:
    """Hyperparameters of one core model.

    ``pad`` extends the hashkey beyond ceil(log2 n) (§5.1: hashkeys long
    enough to avoid duplicates; capped at 50 bits total). ``r0`` is the
    expansion-range factor R = r0·km of Table 1. ``rescale=False`` is the
    Table-4 ablation arm.
    """

    h: int = 10
    width: int = 5
    r0: int = 4
    b: int = 3
    pad: int = 4
    rescale: bool = True
    base_seed: int = 1234
    group: int = 0

    def hashkey_bits(self, n: int) -> int:
        return min(50, max(4, math.ceil(math.log2(max(n, 2))) + self.pad))


@dataclass
class ArrayUnit:
    """One (sorted array, rescaler, RMI) triple."""

    array: SortedKeyArray
    rescaler: KeyRescaler
    rmi: SimplifiedRMI


class CoreModel:
    """Index over one embedding collection (a cluster, or the centroids)."""

    def __init__(self, config: CoreModelConfig):
        self.config = config
        self.emb: np.ndarray | None = None  # (n, d) float32 unit rows
        self.ids: np.ndarray | None = None  # (n,) int64 external ids
        self.esklsh: ESKLSH | None = None
        self.units: list[ArrayUnit] = []
        self.expansion_seconds: float = 0.0
        self.expansion_count: int = 0

    # ------------------------------------------------------------------ build
    def fit(self, emb: np.ndarray, ids: np.ndarray | None = None) -> "CoreModel":
        emb = np.ascontiguousarray(emb, dtype=np.float32)
        n = emb.shape[0]
        if n == 0:
            raise ValueError("cannot index an empty collection")
        self.emb = emb
        self.ids = (
            np.arange(n, dtype=np.int64) if ids is None else np.asarray(ids, dtype=np.int64)
        )
        if self.ids.shape[0] != n:
            raise ValueError("ids must align with embeddings")
        cfg = self.config
        m = cfg.hashkey_bits(n)
        self.esklsh = ESKLSH(
            emb.shape[1], m, cfg.h, base_seed=cfg.base_seed, group=cfg.group
        ).fit(emb)
        self.units = []
        for arr in self.esklsh.arrays:
            rescaler = KeyRescaler(len(arr), enabled=cfg.rescale)
            rmi_keys = rescaler.fit_transform(arr.keys)
            rmi = SimplifiedRMI(cfg.width, len(arr)).fit(
                rmi_keys, np.arange(len(arr), dtype=np.float64)
            )
            self.units.append(ArrayUnit(arr, rescaler, rmi))
        self._stack_params()
        return self

    @classmethod
    def from_parts(
        cls,
        config: CoreModelConfig,
        emb: np.ndarray,
        ids: np.ndarray,
        units: list[ArrayUnit],
    ) -> "CoreModel":
        """Assemble a core model from externally built parts (Spark build)."""
        cm = cls(config)
        cm.emb = np.ascontiguousarray(emb, dtype=np.float32)
        cm.ids = np.asarray(ids, dtype=np.int64)
        m = config.hashkey_bits(cm.emb.shape[0])
        cm.esklsh = ESKLSH(
            cm.emb.shape[1], m, config.h, base_seed=config.base_seed, group=config.group
        )
        cm.esklsh.arrays = [u.array for u in units]
        cm.units = units
        cm._stack_params()
        return cm

    def _stack_params(self) -> None:
        """Stack per-array rescaler/RMI parameters so one query's H location
        predictions are a handful of vectorised ops instead of H Python
        round-trips — the single-query latency path AQT measures."""
        us = self.units
        self._rk_min = np.array([u.rescaler.key_min for u in us], dtype=np.float64)
        self._rk_max = np.array([u.rescaler.key_max for u in us], dtype=np.float64)
        self._rk_enabled = bool(us[0].rescaler.enabled) if us else True
        self._root_a = np.array([u.rmi.root.a for u in us])
        self._root_b = np.array([u.rmi.root.b for u in us])
        self._root_xm = np.array([u.rmi.root.x_mean for u in us])
        w = self.config.width
        self._child_a = np.array([[c.a for c in u.rmi.children] for u in us])
        self._child_b = np.array([[c.b for c in u.rmi.children] for u in us])
        self._child_xm = np.array([[c.x_mean for c in u.rmi.children] for u in us])
        self._w = w
        self._l = float(len(us[0].array)) if us else 0.0
        # Fused affine constants: rescale ∘ linear-model collapses to one
        # slope/intercept per model, halving per-query numpy ops.
        with np.errstate(over="ignore", invalid="ignore", divide="ignore"):
            span = self._rk_max - self._rk_min
            if self._rk_enabled:
                scale = np.where(span > 0, (self._l - 1.0) / span, 0.0)
                shift = -self._rk_min * scale
            else:
                scale = np.ones_like(span)
                shift = np.zeros_like(span)
            self._f_root_a = self._root_a * scale
            self._f_root_b = self._root_a * (shift - self._root_xm) + self._root_b
            self._f_child_a = self._child_a * scale[:, None]
            self._f_child_b = (
                self._child_a * (shift[:, None] - self._child_xm) + self._child_b
            )
        self._h_idx = np.arange(len(us))
        # The fused constants are only numerically safe when training
        # converged (re-scaled keys). The ablation arm (diverged slopes of
        # ±1e30) keeps the unfused path, where clipping semantics match the
        # per-unit reference exactly.
        finite = (
            np.isfinite(self._f_root_a).all()
            and np.isfinite(self._f_root_b).all()
            and np.isfinite(self._f_child_a).all()
            and np.isfinite(self._f_child_b).all()
        )
        biggest = max(
            (np.abs(a).max(initial=0.0) for a in
             (self._f_root_a, self._f_root_b, self._f_child_a, self._f_child_b)),
            default=0.0,
        )
        self._use_fused = bool(self._rk_enabled and finite and biggest < 1e15)

    # ----------------------------------------------------------------- search
    def predict_locations(self, q: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
        """(H,) query hashkeys and (H,) RMI-predicted locations (vectorised
        over the H arrays; equivalent to the per-unit path, see tests)."""
        q_keys = self.esklsh.query_keys(q)
        x = q_keys.astype(np.float64)
        lmax = self._l - 1.0
        h_idx = self._h_idx
        if self._use_fused:
            root = np.clip(self._f_root_a * x + self._f_root_b, 0, lmax)
            j = np.clip((root * (self._w / self._l)).astype(np.int64), 0, self._w - 1)
            pred = self._f_child_a[h_idx, j] * x + self._f_child_b[h_idx, j]
            locs = np.clip(np.rint(pred), 0, lmax).astype(np.int64)
            return q_keys, locs
        if self._rk_enabled:
            span = self._rk_max - self._rk_min
            with np.errstate(invalid="ignore", divide="ignore"):
                x = np.where(span > 0, (x - self._rk_min) / span * (self._l - 1.0), 0.0)
        with np.errstate(over="ignore", invalid="ignore"):
            root = self._root_a * (x - self._root_xm) + self._root_b
        root = np.clip(np.nan_to_num(root, nan=0.0, posinf=1e30, neginf=-1e30), 0, lmax)
        j = np.clip((root * self._w / self._l).astype(np.int64), 0, self._w - 1)
        with np.errstate(over="ignore", invalid="ignore"):
            pred = (
                self._child_a[h_idx, j] * (x - self._child_xm[h_idx, j])
                + self._child_b[h_idx, j]
            )
        pred = np.nan_to_num(pred, nan=0.0, posinf=1e30, neginf=-1e30)
        locs = np.clip(np.rint(pred), 0, lmax).astype(np.int64)
        return q_keys, locs

    def predict_locations_reference(self, q: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
        """Per-unit (unstacked) prediction path — kept as the readable
        reference implementation; tests assert it matches the fast path."""
        q_keys = self.esklsh.query_keys(q)
        locs = np.empty(len(self.units), dtype=np.int64)
        for i, unit in enumerate(self.units):
            rmi_key = unit.rescaler.transform(np.array([q_keys[i]], dtype=np.uint64))
            locs[i] = unit.rmi.predict_location(rmi_key)[0]
        return q_keys, locs

    def candidate_rows(self, q: np.ndarray, km: int) -> np.ndarray:
        """Steps 1–4 of the core-model search; instrumented for Table 3."""
        t0 = time.perf_counter()
        _, locs = self.predict_locations(q)
        r = max(1, self.config.r0 * km)
        rows = self.esklsh.candidate_rows(locs, r)
        self.expansion_seconds += time.perf_counter() - t0
        self.expansion_count += 1
        return rows

    def search(self, q: np.ndarray, km: int) -> tuple[np.ndarray, np.ndarray]:
        """Top-km (external ids, cosine scores), scores descending."""
        q = np.asarray(q, dtype=np.float32)
        rows = self.candidate_rows(q, km)
        if rows.size == 0:
            return np.empty(0, dtype=np.int64), np.empty(0, dtype=np.float32)
        scores = self.emb[rows] @ q
        kk = min(km, rows.size)
        top = np.argpartition(-scores, kk - 1)[:kk]
        top = top[np.argsort(-scores[top])]
        return self.ids[rows[top]], scores[top]

    # ------------------------------------------------------------------ stats
    @property
    def n(self) -> int:
        return 0 if self.emb is None else self.emb.shape[0]

    @property
    def planes_nbytes(self) -> int:
        """Bytes of this model's hyperplane matrices (shared across core
        models in the same seed group — LIDER counts them once)."""
        return 0 if self.esklsh is None else self.esklsh.planes_nbytes

    @property
    def nbytes(self) -> int:
        """Index-only memory (paper Table 5 excludes the data embeddings)."""
        total = 0
        if self.esklsh is not None:
            total += self.esklsh.nbytes
        for u in self.units:
            total += u.rmi.nbytes + 4 * 8  # rescaler: 4 scalar params
        total += 0 if self.ids is None else self.ids.nbytes
        return total

    def reset_expansion_stats(self) -> None:
        self.expansion_seconds = 0.0
        self.expansion_count = 0

    @property
    def avg_expansion_seconds(self) -> float:
        return self.expansion_seconds / max(1, self.expansion_count)
