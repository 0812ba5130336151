"""Tests for the TrajStore baseline (adaptive quadtree storage)."""
import numpy as np
import pytest

from repro.baselines.trajstore import TrajStore, bounds_of


def _stream(seed=0, n_traj=20, n_steps=10):
    g = np.random.default_rng(seed)
    base = g.random((n_traj, 2))
    batches = []
    for t in range(1, n_steps + 1):
        pts = base + g.normal(0, 0.01, (n_traj, 2)) * t
        batches.append((np.arange(n_traj), np.full(n_traj, t), pts))
    return batches


@pytest.fixture()
def store():
    s = TrajStore((0.0, 0.0, 1.5, 1.5), cell_capacity=30, seed=0)
    for ids, ts, pts in _stream():
        s.insert_batch(ids, ts, np.clip(pts, 0, 1.5))
    return s


class TestIndexMaintenance:
    def test_all_points_stored(self, store):
        total = sum(len(lf.ids) for lf in store.leaves())
        assert total == 20 * 10

    def test_splits_happened(self, store):
        assert store.n_splits > 0
        assert len(store.leaves()) > 1

    def test_capacity_respected_or_max_depth(self, store):
        for lf in store.leaves():
            assert len(lf.ids) <= 30 or lf.depth >= store.max_depth

    def test_leaf_for_contains_point(self, store):
        lf = store.leaf_for(0.5, 0.5)
        assert lf.x0 <= 0.5 <= lf.x1
        assert lf.y0 <= 0.5 <= lf.y1

    def test_points_in_their_leaf(self, store):
        for lf in store.leaves():
            for p in lf.pts[:5]:
                assert lf.x0 <= p[0] <= lf.x1
                assert lf.y0 <= p[1] <= lf.y1

    def test_build_time_recorded(self, store):
        assert store.build_seconds > 0


class TestSummarize:
    def test_eps_bound(self, store):
        summ = store.summarize(eps=0.05)
        for lf in store.leaves():
            if not lf.ids:
                continue
            pts = np.vstack(lf.pts)
            rec = summ.reconstruct(np.asarray(lf.ids), np.asarray(lf.ts))
            err = np.sqrt(((pts - rec) ** 2).sum(axis=1))
            assert err.max() <= 0.05 + 1e-12

    def test_budget_proportional(self, store):
        summ = store.summarize(total_codewords=50)
        # allocations are proportional with a floor of 1 per cell
        n_cells = len([lf for lf in store.leaves() if lf.ids])
        assert summ.n_codewords >= min(50, n_cells)
        assert len(summ.cell_stats) == n_cells

    def test_exactly_one_mode(self, store):
        with pytest.raises(ValueError):
            store.summarize()
        with pytest.raises(ValueError):
            store.summarize(eps=0.1, total_codewords=10)

    def test_bigger_budget_less_error(self, store):
        errs = []
        for v in (10, 400):
            summ = store.summarize(total_codewords=v)
            e = []
            for lf in store.leaves():
                if not lf.ids:
                    continue
                pts = np.vstack(lf.pts)
                rec = summ.reconstruct(np.asarray(lf.ids), np.asarray(lf.ts))
                e.append(np.sqrt(((pts - rec) ** 2).sum(axis=1)).mean())
            errs.append(np.mean(e))
        assert errs[1] < errs[0]

    def test_summary_bits_positive(self, store):
        summ = store.summarize(total_codewords=40)
        assert summ.summary_bits() > summ.n_codewords * 64


class TestBounds:
    def test_bounds_of(self):
        pts = np.array([[0.0, 1.0], [2.0, -1.0]])
        x0, y0, x1, y1 = bounds_of(pts)
        assert x0 <= 0.0 and y0 <= -1.0 and x1 >= 2.0 and y1 >= 1.0

    def test_duplicate_points_no_infinite_split(self):
        s = TrajStore((0, 0, 1, 1), cell_capacity=5, max_depth=6, seed=0)
        pts = np.full((50, 2), 0.5)
        s.insert_batch(np.arange(50), np.ones(50, dtype=int), pts)
        # duplicates exceed capacity but max_depth stops recursion
        assert sum(len(lf.ids) for lf in s.leaves()) == 50
