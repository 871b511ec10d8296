"""Tests for the hyperplane random-projection LSH family (§4.1)."""
import numpy as np
import pytest

from repro.lsh.projections import RandomHyperplanes, make_projection_family


def _unit(v):
    return v / np.linalg.norm(v)


class TestRandomHyperplanes:
    def test_deterministic_in_seed_key(self):
        a = RandomHyperplanes(16, 8, (1, 2, 3))
        b = RandomHyperplanes(16, 8, (1, 2, 3))
        assert np.array_equal(a.planes, b.planes)

    def test_different_seed_keys_differ(self):
        a = RandomHyperplanes(16, 8, (1, 2, 3))
        b = RandomHyperplanes(16, 8, (1, 2, 4))
        assert not np.array_equal(a.planes, b.planes)

    def test_negative_group_supported(self):
        # The centroids retriever uses group=-1.
        RandomHyperplanes(8, 4, (1234, -1, 0))

    def test_bits_shape_batch(self):
        h = RandomHyperplanes(8, 12, (0, 0, 0))
        x = np.random.default_rng(0).standard_normal((5, 8))
        assert h.bits(x).shape == (5, 12)

    def test_bits_shape_single(self):
        h = RandomHyperplanes(8, 12, (0, 0, 0))
        assert h.bits(np.ones(8)).shape == (12,)

    def test_keys_scalar_for_single_vector(self):
        h = RandomHyperplanes(8, 12, (0, 0, 0))
        k = h.keys(np.ones(8))
        assert np.isscalar(k) or k.shape == ()

    def test_keys_match_bits(self):
        from repro.lsh.hashkeys import pack_bits

        h = RandomHyperplanes(8, 10, (0, 1, 2))
        x = np.random.default_rng(1).standard_normal((7, 8))
        assert np.array_equal(h.keys(x), pack_bits(h.bits(x)))

    def test_identical_vectors_identical_keys(self):
        h = RandomHyperplanes(16, 20, (5, 5, 5))
        v = np.random.default_rng(2).standard_normal(16)
        assert h.keys(v) == h.keys(v.copy())

    def test_antipodal_vectors_opposite_bits(self):
        h = RandomHyperplanes(16, 20, (5, 5, 5))
        v = np.random.default_rng(3).standard_normal(16)
        b1, b2 = h.bits(v), h.bits(-v)
        # Projections are never exactly zero for random data.
        assert np.array_equal(b1, 1 - b2)

    def test_invalid_dim_raises(self):
        with pytest.raises(ValueError):
            RandomHyperplanes(0, 8, (0, 0, 0))

    def test_collision_probability_monotone_in_angle(self):
        """Eq. 2: P[h(u)=h(v)] = 1 − θ/π — closer vectors collide more."""
        g = np.random.default_rng(7)
        dim, m = 32, 2000  # many hash bits → tight empirical estimate
        h = RandomHyperplanes(dim, 50, (9, 9, 9))
        planes = g.standard_normal((m, dim)).astype(np.float32)
        u = _unit(g.standard_normal(dim))
        rates = []
        for noise in (0.1, 0.5, 2.0):
            v = _unit(u + noise * g.standard_normal(dim))
            bu = (planes @ u) > 0
            bv = (planes @ v) > 0
            theta = np.arccos(np.clip(u @ v, -1, 1))
            rate = (bu == bv).mean()
            rates.append(rate)
            assert rate == pytest.approx(1 - theta / np.pi, abs=0.05)
        assert rates[0] > rates[1] > rates[2]


class TestFamily:
    def test_family_size(self):
        fam = make_projection_family(8, 6, h=5)
        assert len(fam) == 5

    def test_family_members_independent(self):
        fam = make_projection_family(8, 6, h=3)
        assert not np.array_equal(fam[0].planes, fam[1].planes)
        assert not np.array_equal(fam[1].planes, fam[2].planes)

    def test_groups_distinct(self):
        a = make_projection_family(8, 6, h=2, group=0)
        b = make_projection_family(8, 6, h=2, group=1)
        assert not np.array_equal(a[0].planes, b[0].planes)

    def test_group_deterministic(self):
        a = make_projection_family(8, 6, h=2, group=3)
        b = make_projection_family(8, 6, h=2, group=3)
        assert np.array_equal(a[1].planes, b[1].planes)

    def test_nbytes_positive(self):
        fam = make_projection_family(8, 6, h=2)
        assert fam[0].nbytes == 6 * 8 * 4
