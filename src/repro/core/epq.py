"""E-PQ: error-bounded predictive quantization (paper Algorithm 1).

``EPQEngine`` consumes one timestep batch at a time: fit the shared
prediction coefficients P[t] on the active trajectories' reconstructed
histories, quantize the prediction errors, reconstruct, and push the
reconstructions back into the history (Alg. 1 lines 3-7). It is used
standalone (the paper's E-PQ baseline: one partition) and as the
per-partition engine inside PPQ.

Codebook modes:
  * ``global``  -- one incremental error-bounded codebook across all time
                   (the online summarization of Sections 3, Tables 5/6);
  * ``per_t``   -- a fresh error-bounded codebook per timestamp
                   (Table 2's "learn C independently for every timestamp");
  * ``fixed``   -- a fresh fixed-size k-means codebook per timestamp
                   (Table 4's 5-9 bit budgets). No error bound.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core.predictor import DEFAULT_K, History, fit_coeffs, predict
from repro.core.quantizer import (
    FixedQuantizer,
    IncrementalQuantizer,
    OnlineBudgetQuantizer,
)


@dataclass
class StepResult:
    """Per-timestep output of one engine step."""

    codes: np.ndarray  # codeword index per point (engine-local codebook id)
    recon: np.ndarray  # (n, 2) codebook reconstruction That
    pred: np.ndarray  # (n, 2) prediction Ttilde
    codebook_t: np.ndarray | None = None  # per-step codebook (per_t/fixed)


class EPQEngine:
    """Sequential-in-t E-PQ over one partition's trajectories."""

    def __init__(
        self,
        eps1: float,
        *,
        k: int = DEFAULT_K,
        seed: int = 0,
        predict_enabled: bool = True,
        history: History | None = None,
        codebook_mode: str = "global",
        fixed_codewords: int | None = None,
        quantizer_style: str = "kmeans",
    ):
        if codebook_mode not in ("global", "per_t", "fixed"):
            raise ValueError(f"unknown codebook_mode {codebook_mode!r}")
        self.eps1 = float(eps1)
        self.k = int(k)
        self.seed = seed
        self.predict_enabled = predict_enabled
        self.history = history if history is not None else History(k)
        self.codebook_mode = codebook_mode
        self.fixed_codewords = fixed_codewords
        if quantizer_style not in ("kmeans", "online"):
            raise ValueError(f"unknown quantizer_style {quantizer_style!r}")
        self.quantizer_style = quantizer_style
        self.quantizer = IncrementalQuantizer(eps1, seed=seed)
        self.coeffs: dict[int, np.ndarray] = {}
        self.codebooks_t: dict[int, np.ndarray] = {}  # per_t / fixed modes
        self.codebook_size_t: dict[int, int] = {}

    def step(
        self, t: int, ids: np.ndarray, pts: np.ndarray, *, budget: int | None = None
    ) -> StepResult:
        """Process the points of this partition at time ``t`` (Alg. 1 body)."""
        ids = np.asarray(ids)
        pts = np.atleast_2d(np.asarray(pts, dtype=np.float64))
        n = len(ids)
        pred = np.zeros((n, 2))
        coeffs = np.zeros(self.k)
        if self.predict_enabled:
            warm = self.history.warm_ids(ids)
            if warm.any():
                hist = self.history.matrix(ids[warm])
                coeffs = fit_coeffs(hist, pts[warm])
                pred[warm] = predict(hist, coeffs)
            # Ramp-up: a trajectory with some but fewer than k
            # reconstructions is predicted by its last reconstruction (a
            # random-walk predictor). Only a trajectory's very first point
            # is coded against prediction zero; without this, every new
            # partition would pay full raw-coordinate codebook coverage
            # for its cold points (see DESIGN.md).
            for i in np.flatnonzero(~warm):
                last = self.history.last(int(ids[i]))
                if last is not None:
                    pred[i] = last
        self.coeffs[t] = coeffs
        errs = pts - pred

        if self.codebook_mode == "global":
            codes = self.quantizer.quantize(errs)
            recon = pred + self.quantizer.reconstruct(codes)
            self.codebook_size_t[t] = len(self.quantizer)
            cb_t = None
        elif self.codebook_mode == "per_t":
            q = IncrementalQuantizer(self.eps1, seed=self.seed + t)
            codes = q.quantize(errs)
            recon = pred + q.reconstruct(codes)
            cb_t = q.codebook
            self.codebooks_t[t] = cb_t
            self.codebook_size_t[t] = len(q)
        else:  # fixed
            v = budget if budget is not None else self.fixed_codewords
            if v is None:
                raise ValueError("fixed mode needs a codeword budget")
            cls = (
                OnlineBudgetQuantizer
                if self.quantizer_style == "online"
                else FixedQuantizer
            )
            q = cls(max(1, v), seed=self.seed + t)
            codes = q.fit_quantize(errs)
            recon = pred + q.reconstruct(codes)
            cb_t = q.codebook
            self.codebooks_t[t] = cb_t
            self.codebook_size_t[t] = len(cb_t)

        self.history.push(ids, recon)
        return StepResult(codes=codes, recon=recon, pred=pred, codebook_t=cb_t)

    @property
    def n_codewords(self) -> int:
        """Total codewords produced by this engine."""
        if self.codebook_mode == "global":
            return len(self.quantizer)
        return int(sum(len(cb) for cb in self.codebooks_t.values()))

    def codebook_bits(self, *, bits_per_value: int = 32) -> int:
        """Storage of the codebook(s): 2 floats per codeword."""
        return self.n_codewords * 2 * bits_per_value
