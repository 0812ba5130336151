"""Tests for the error-bounded / fixed / online quantizers (Eq. 3)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.quantizer import (
    FixedQuantizer,
    IncrementalQuantizer,
    OnlineBudgetQuantizer,
    nearest,
)


class TestNearest:
    def test_exact_match(self):
        cb = np.array([[0.0, 0.0], [1.0, 1.0]])
        codes, dists = nearest(cb, np.array([[1.0, 1.0]]))
        assert codes[0] == 1
        assert dists[0] == pytest.approx(0.0)

    def test_distances(self):
        cb = np.array([[0.0, 0.0]])
        codes, dists = nearest(cb, np.array([[3.0, 4.0]]))
        assert dists[0] == pytest.approx(5.0)

    def test_batch(self):
        g = np.random.default_rng(0)
        cb = g.random((10, 2))
        pts = g.random((500, 2))
        codes, dists = nearest(cb, pts)
        d2 = ((pts[:, None, :] - cb[None, :, :]) ** 2).sum(axis=2)
        assert np.array_equal(codes, d2.argmin(axis=1))


class TestIncrementalQuantizer:
    @pytest.mark.parametrize("eps", [1.0, 0.3, 0.1, 0.02])
    def test_error_bound_holds(self, eps):
        g = np.random.default_rng(1)
        q = IncrementalQuantizer(eps, seed=0)
        pts = g.random((400, 2)) * 3
        codes = q.quantize(pts)
        err = np.sqrt(((pts - q.reconstruct(codes)) ** 2).sum(axis=1))
        assert err.max() <= eps + 1e-12

    def test_bound_holds_across_batches(self):
        g = np.random.default_rng(2)
        q = IncrementalQuantizer(0.2, seed=0)
        for _ in range(5):
            pts = g.random((100, 2)) * 2
            codes = q.quantize(pts)
            err = np.sqrt(((pts - q.reconstruct(codes)) ** 2).sum(axis=1))
            assert err.max() <= 0.2 + 1e-12

    def test_codebook_grows_monotonically(self):
        g = np.random.default_rng(3)
        q = IncrementalQuantizer(0.1, seed=0)
        sizes = []
        for _ in range(4):
            q.quantize(g.random((50, 2)))
            sizes.append(len(q))
        assert sizes == sorted(sizes)

    def test_reuse_no_growth_for_same_data(self):
        g = np.random.default_rng(4)
        pts = g.random((100, 2))
        q = IncrementalQuantizer(0.1, seed=0)
        q.quantize(pts)
        v1 = len(q)
        q.quantize(pts)  # same points: existing codewords suffice
        assert len(q) == v1

    def test_tighter_eps_bigger_codebook(self):
        g = np.random.default_rng(5)
        pts = g.random((300, 2))
        qa = IncrementalQuantizer(0.3, seed=0)
        qa.quantize(pts.copy())
        qb = IncrementalQuantizer(0.03, seed=0)
        qb.quantize(pts.copy())
        assert len(qb) > len(qa)

    def test_codes_valid_indices(self):
        q = IncrementalQuantizer(0.1, seed=0)
        codes = q.quantize(np.random.default_rng(6).random((50, 2)))
        assert codes.min() >= 0
        assert codes.max() < len(q)

    def test_single_point(self):
        q = IncrementalQuantizer(0.5, seed=0)
        codes = q.quantize(np.array([[2.0, 3.0]]))
        assert np.allclose(q.reconstruct(codes), [[2.0, 3.0]])

    def test_empty_codebook_property(self):
        q = IncrementalQuantizer(0.5)
        assert q.codebook.shape == (0, 2)

    @settings(max_examples=25, deadline=None)
    @given(
        st.lists(
            st.tuples(
                st.floats(-10, 10, allow_nan=False),
                st.floats(-10, 10, allow_nan=False),
            ),
            min_size=1,
            max_size=60,
        ),
        st.floats(0.01, 2.0),
    )
    def test_property_bound(self, pts, eps):
        pts = np.array(pts)
        q = IncrementalQuantizer(eps, seed=0)
        codes = q.quantize(pts)
        err = np.sqrt(((pts - q.reconstruct(codes)) ** 2).sum(axis=1))
        assert err.max() <= eps + 1e-9


class TestFixedQuantizer:
    @pytest.mark.parametrize("v", [1, 2, 8, 32])
    def test_codebook_size(self, v):
        g = np.random.default_rng(7)
        q = FixedQuantizer(v, seed=0)
        codes = q.fit_quantize(g.random((100, 2)))
        assert len(q.codebook) == v
        assert codes.max() < v

    def test_budget_clamped_to_n(self):
        q = FixedQuantizer(50, seed=0)
        q.fit_quantize(np.random.default_rng(8).random((5, 2)))
        assert len(q.codebook) == 5

    def test_more_codewords_less_error(self):
        g = np.random.default_rng(9)
        pts = g.random((400, 2))
        errs = []
        for v in (4, 64):
            q = FixedQuantizer(v, seed=0)
            codes = q.fit_quantize(pts)
            errs.append(
                np.sqrt(((pts - q.reconstruct(codes)) ** 2).sum(axis=1)).mean()
            )
        assert errs[1] < errs[0]


class TestOnlineBudgetQuantizer:
    @pytest.mark.parametrize("v", [1, 4, 16])
    def test_codebook_size(self, v):
        g = np.random.default_rng(10)
        q = OnlineBudgetQuantizer(v, seed=0)
        codes = q.fit_quantize(g.random((100, 2)))
        assert len(q.codebook) == min(v, 100)
        assert codes.max() < len(q.codebook)

    def test_worse_than_kmeans(self):
        """The single-pass quantizer must not beat batch k-means --
        that gap is the paper's Q-trajectory-vs-others story."""
        g = np.random.default_rng(11)
        pts = g.random((500, 2))
        qo = OnlineBudgetQuantizer(16, seed=0)
        co = qo.fit_quantize(pts)
        qk = FixedQuantizer(16, seed=0)
        ck = qk.fit_quantize(pts)
        e_onl = np.sqrt(((pts - qo.reconstruct(co)) ** 2).sum(axis=1)).mean()
        e_km = np.sqrt(((pts - qk.reconstruct(ck)) ** 2).sum(axis=1)).mean()
        assert e_onl >= e_km * 0.9  # allow slack; typically strictly worse

    def test_codewords_are_data_points(self):
        g = np.random.default_rng(12)
        pts = g.random((50, 2))
        q = OnlineBudgetQuantizer(8, seed=0)
        q.fit_quantize(pts)
        for c in q.codebook:
            assert ((pts == c).all(axis=1)).any()
