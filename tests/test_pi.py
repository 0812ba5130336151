"""Tests for the partition-based index PI (paper Algorithm 3)."""
import numpy as np
import pytest

from repro.index.pi import PI, build_pi


def _frame(seed=0, n=120, spread=0.3):
    g = np.random.default_rng(seed)
    centers = np.array([[0.0, 0.0], [2.0, 2.0], [4.0, 0.0]])
    pts = centers[g.integers(0, 3, n)] + g.normal(0, spread, (n, 2))
    return np.arange(n), pts[:, 0], pts[:, 1]


@pytest.fixture()
def pi():
    ids, xs, ys = _frame()
    return build_pi(1, ids, xs, ys, eps_s=1.0, gc=0.25, seed=0)


class TestBuild:
    def test_all_points_covered(self, pi):
        ids, xs, ys = _frame()
        assert (pi.rect_of(xs, ys) >= 0).all()

    def test_rects_disjoint(self, pi):
        for i, a in enumerate(pi.rects):
            for b in pi.rects[i + 1 :]:
                assert not a.intersects(b)

    def test_multiple_rects_for_clustered_data(self, pi):
        assert len(pi.rects) >= 3

    def test_build_time_recorded(self, pi):
        assert pi.build_seconds > 0

    def test_built_at(self, pi):
        assert pi.built_at == 1


class TestQuery:
    def test_query_returns_cell_members(self, pi):
        ids, xs, ys = _frame()
        for i in (0, 17, 55):
            got = pi.query(xs[i], ys[i], 1)
            assert ids[i] in got

    def test_query_matches_brute_force(self, pi):
        ids, xs, ys = _frame()
        ri = pi.rect_of(xs, ys)
        for i in (3, 42, 99):
            got = set(pi.query(xs[i], ys[i], 1).tolist())
            key = pi.cell_of(int(ri[i]), xs[i], ys[i])
            expect = {
                int(ids[j])
                for j in range(len(ids))
                if ri[j] == ri[i]
                and pi.cell_of(int(ri[j]), xs[j], ys[j]) == key
            }
            assert got == expect

    def test_query_missing_time_empty(self, pi):
        ids, xs, ys = _frame()
        assert len(pi.query(xs[0], ys[0], 99)) == 0

    def test_query_outside_rects_empty(self, pi):
        assert len(pi.query(100.0, 100.0, 1)) == 0

    def test_query_circle_superset_of_cell(self, pi):
        ids, xs, ys = _frame()
        plain = set(pi.query(xs[0], ys[0], 1).tolist())
        circle = set(pi.query_circle(xs[0], ys[0], 1, radius=0.5).tolist())
        assert plain <= circle

    def test_query_circle_zero_radius(self, pi):
        ids, xs, ys = _frame()
        got = set(pi.query_circle(xs[5], ys[5], 1, radius=1e-12).tolist())
        assert ids[5] in got


class TestMaintenance:
    def test_add_points_second_timestamp(self, pi):
        ids, xs, ys = _frame(seed=1)
        uncov = pi.add_points(2, ids, xs, ys)
        covered = ~uncov
        for i in np.flatnonzero(covered)[:10]:
            assert ids[i] in pi.query(xs[i], ys[i], 2)

    def test_uncovered_mask(self, pi):
        uncov = pi.add_points(3, np.array([999]), np.array([50.0]), np.array([50.0]))
        assert uncov.all()

    def test_extend_absorbs_other(self, pi):
        other = build_pi(
            4, np.array([1000, 1001]), np.array([50.0, 50.1]),
            np.array([50.0, 50.1]), eps_s=1.0, gc=0.25, seed=1,
        )
        n_before = len(pi.rects)
        pi.extend(other)
        assert len(pi.rects) == n_before + len(other.rects)
        assert 1000 in pi.query(50.0, 50.0, 4)


class TestAccounting:
    def test_counts_per_rect_sum(self, pi):
        assert pi.counts_per_rect(1).sum() == 120

    def test_counts_zero_for_missing_t(self, pi):
        assert pi.counts_per_rect(77).sum() == 0

    def test_rect_sizes_positive(self, pi):
        assert (pi.rect_sizes() >= 1).all()

    def test_size_bits_grows_with_data(self, pi):
        before = pi.size_bits()
        ids, xs, ys = _frame(seed=2)
        pi.add_points(5, ids, xs, ys)
        assert pi.size_bits() > before
