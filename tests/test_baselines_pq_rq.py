"""Tests for the product / residual quantization baselines."""
import numpy as np
import pytest

from repro.baselines.pq import product_quantize
from repro.baselines.rq import residual_quantize


def _pts(seed=0, n=300, scale=1.0):
    return np.random.default_rng(seed).random((n, 2)) * scale


class TestProductQuantization:
    @pytest.mark.parametrize("eps", [0.5, 0.1, 0.02])
    def test_eps_bound(self, eps):
        pts = _pts(1)
        r = product_quantize(pts, eps=eps, seed=0)
        err = np.sqrt(((pts - r.recon) ** 2).sum(axis=1))
        assert err.max() <= eps + 1e-12

    def test_budget_mode_codeword_count(self):
        pts = _pts(2)
        r = product_quantize(pts, n_codewords=16, seed=0)
        assert r.n_codewords == 16

    def test_budget_split_across_axes(self):
        pts = _pts(3)
        r = product_quantize(pts, n_codewords=9, seed=0)
        assert r.n_codewords == 9  # 4 + 5

    def test_more_budget_less_error(self):
        pts = _pts(4)
        e = []
        for v in (4, 64):
            r = product_quantize(pts, n_codewords=v, seed=0)
            e.append(np.sqrt(((pts - r.recon) ** 2).sum(axis=1)).mean())
        assert e[1] < e[0]

    def test_tighter_eps_more_codewords(self):
        pts = _pts(5)
        a = product_quantize(pts, eps=0.3, seed=0)
        b = product_quantize(pts, eps=0.03, seed=0)
        assert b.n_codewords > a.n_codewords

    def test_exactly_one_mode_required(self):
        pts = _pts(6)
        with pytest.raises(ValueError):
            product_quantize(pts)
        with pytest.raises(ValueError):
            product_quantize(pts, eps=0.1, n_codewords=4)

    def test_bits_positive(self):
        r = product_quantize(_pts(7), n_codewords=8, seed=0)
        assert r.code_bits_per_point >= 2

    def test_single_point(self):
        r = product_quantize(np.array([[1.0, 2.0]]), eps=0.1, seed=0)
        assert np.allclose(r.recon, [[1.0, 2.0]])


class TestResidualQuantization:
    @pytest.mark.parametrize("eps", [0.5, 0.1, 0.02])
    def test_eps_bound(self, eps):
        pts = _pts(8)
        r = residual_quantize(pts, eps=eps, seed=0)
        err = np.sqrt(((pts - r.recon) ** 2).sum(axis=1))
        assert err.max() <= eps + 1e-12

    def test_eps_bound_large_scale(self):
        pts = _pts(9, scale=100.0)
        r = residual_quantize(pts, eps=1.0, stage_size=16, seed=0)
        err = np.sqrt(((pts - r.recon) ** 2).sum(axis=1))
        assert err.max() <= 1.0 + 1e-9

    def test_budget_mode_total(self):
        pts = _pts(10)
        r = residual_quantize(pts, n_codewords=16, n_stages=2, seed=0)
        assert r.n_codewords == 16
        assert r.n_stages == 2

    def test_stages_refine(self):
        """Each added stage reduces the residual."""
        pts = _pts(11)
        one = residual_quantize(pts, n_codewords=8, n_stages=1, seed=0)
        two = residual_quantize(pts, n_codewords=16, n_stages=2, seed=0)
        e1 = np.sqrt(((pts - one.recon) ** 2).sum(axis=1)).mean()
        e2 = np.sqrt(((pts - two.recon) ** 2).sum(axis=1)).mean()
        assert e2 < e1

    def test_exactly_one_mode_required(self):
        pts = _pts(12)
        with pytest.raises(ValueError):
            residual_quantize(pts)
        with pytest.raises(ValueError):
            residual_quantize(pts, eps=0.1, n_codewords=4)

    def test_tighter_eps_more_codewords(self):
        pts = _pts(13)
        a = residual_quantize(pts, eps=0.3, seed=0)
        b = residual_quantize(pts, eps=0.01, seed=0)
        assert b.n_codewords > a.n_codewords

    def test_loose_eps_short_circuit(self):
        """An eps larger than the data span needs a single tiny stage."""
        pts = _pts(14) * 0.001
        r = residual_quantize(pts, eps=10.0, seed=0)
        assert r.n_stages <= 1

    def test_single_point(self):
        r = residual_quantize(np.array([[1.0, 2.0]]), eps=0.1, seed=0)
        assert np.allclose(r.recon, [[1.0, 2.0]])

    def test_bits_accumulate_per_stage(self):
        pts = _pts(15, scale=50.0)
        r = residual_quantize(pts, eps=0.05, stage_size=8, seed=0)
        assert r.code_bits_per_point >= 3 * (r.n_stages >= 1)
