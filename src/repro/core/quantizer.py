"""Error-bounded and fixed-size vector quantizers (paper Eq. 3).

``IncrementalQuantizer`` maintains a codebook C so that every quantized
vector e satisfies ``||e - C(b)||_2 <= eps`` -- when new vectors violate
the bound with the existing codewords, additional codewords are grown from
the violators (the paper's "additional codewords are added to update C").

``FixedQuantizer`` is the budgeted variant used by the Table 2/4
experiments, where every method is given the *same number* of codewords.
"""
from __future__ import annotations

import numpy as np

from repro.core.kmeans import grow_partition, kmeans


def nearest(codebook: np.ndarray, pts: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Nearest codeword per point. Returns (codes, distances)."""
    pts = np.atleast_2d(pts)
    # chunk so the (n, V) distance matrix stays small
    codes = np.empty(len(pts), dtype=np.int64)
    dists = np.empty(len(pts))
    step = max(1, 4_000_000 // max(1, len(codebook)))
    for s in range(0, len(pts), step):
        block = pts[s : s + step]
        d2 = ((block[:, None, :] - codebook[None, :, :]) ** 2).sum(axis=2)
        codes[s : s + step] = d2.argmin(axis=1)
        dists[s : s + step] = np.sqrt(d2[np.arange(len(block)), codes[s : s + step]])
    return codes, dists


class IncrementalQuantizer:
    """Online codebook with a hard per-vector error bound ``eps``."""

    def __init__(self, eps: float, *, seed: int = 0):
        self.eps = float(eps)
        self.seed = seed
        self._codewords: list[np.ndarray] = []
        self._arr: np.ndarray | None = None

    def __len__(self) -> int:
        return len(self._codewords)

    @property
    def codebook(self) -> np.ndarray:
        """Codeword array, shape (V, 2)."""
        if self._arr is None or len(self._arr) != len(self._codewords):
            self._arr = (
                np.vstack(self._codewords)
                if self._codewords
                else np.zeros((0, 2))
            )
        return self._arr

    def quantize(self, errs: np.ndarray) -> np.ndarray:
        """Assign codes to ``errs`` (n, 2), growing C to keep the bound."""
        errs = np.atleast_2d(np.asarray(errs, dtype=np.float64))
        n = len(errs)
        codes = np.full(n, -1, dtype=np.int64)
        if len(self._codewords):
            codes[:], dists = nearest(self.codebook, errs)
            bad = dists > self.eps
        else:
            bad = np.ones(n, dtype=bool)
        if bad.any():
            labels, cents, _ = grow_partition(
                errs[bad], self.eps, seed=self.seed + len(self._codewords)
            )
            # only keep non-empty clusters, remap labels to new code ids
            offset = len(self._codewords)
            remap = {}
            for j in np.unique(labels):
                remap[int(j)] = offset + len(remap)
                self._codewords.append(cents[int(j)])
            self._arr = None
            codes[bad] = np.array([remap[int(l)] for l in labels], dtype=np.int64)
        return codes

    def reconstruct(self, codes: np.ndarray) -> np.ndarray:
        """Codeword vectors for ``codes``."""
        return self.codebook[np.asarray(codes, dtype=np.int64)]

    def absorb(self, other: "IncrementalQuantizer") -> int:
        """Append another quantizer's codewords (partition merge,
        Section 3.2.2). Returns the offset the other's codes shift by."""
        offset = len(self._codewords)
        self._codewords.extend(other._codewords)
        self._arr = None
        return offset


class OnlineBudgetQuantizer:
    """Single-pass budgeted codebook (no Lloyd refinement).

    Codewords are chosen greedily farthest-first (k-center maxmin) from
    the batch, then points are assigned to their nearest codeword. This
    models an *online* quantizer that cannot iterate over the data --
    the regime the paper's Q-trajectory operates in when it is given a
    fixed codeword budget instead of an error bound.
    """

    def __init__(self, n_codewords: int, *, seed: int = 0):
        self.n_codewords = int(n_codewords)
        self.seed = seed
        self.codebook = np.zeros((0, 2))

    def fit_quantize(self, errs: np.ndarray) -> np.ndarray:
        errs = np.atleast_2d(np.asarray(errs, dtype=np.float64))
        n = len(errs)
        k = max(1, min(self.n_codewords, n))
        g = np.random.default_rng(self.seed)
        cents = np.empty((k, errs.shape[1]))
        cents[0] = errs[g.integers(0, n)]
        d2 = ((errs - cents[0]) ** 2).sum(axis=1)
        for j in range(1, k):
            cents[j] = errs[int(np.argmax(d2))]
            d2 = np.minimum(d2, ((errs - cents[j]) ** 2).sum(axis=1))
        self.codebook = cents
        codes, _ = nearest(cents, errs)
        return codes

    def reconstruct(self, codes: np.ndarray) -> np.ndarray:
        return self.codebook[np.asarray(codes, dtype=np.int64)]


class FixedQuantizer:
    """Batch k-means codebook with exactly ``n_codewords`` entries."""

    def __init__(self, n_codewords: int, *, seed: int = 0):
        self.n_codewords = int(n_codewords)
        self.seed = seed
        self.codebook = np.zeros((0, 2))

    def fit_quantize(self, errs: np.ndarray) -> np.ndarray:
        """Fit the codebook on ``errs`` and return their codes."""
        errs = np.atleast_2d(np.asarray(errs, dtype=np.float64))
        labels, cents = kmeans(errs, self.n_codewords, seed=self.seed)
        self.codebook = cents
        return labels

    def reconstruct(self, codes: np.ndarray) -> np.ndarray:
        return self.codebook[np.asarray(codes, dtype=np.int64)]
