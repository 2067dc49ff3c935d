"""The numpy Siamese MLP: forward/backward correctness and training."""
import numpy as np
import pytest

from repro.core.siamese import SiameseMLP


class TestForward:
    def test_output_in_unit_interval(self):
        m = SiameseMLP(4, seed=0)
        x = np.random.default_rng(0).normal(size=(10, 4))
        o = m.predict(x)
        assert o.shape == (10,)
        assert np.all((o > 0) & (o < 1))

    def test_deterministic_given_seed(self):
        x = np.random.default_rng(0).normal(size=(5, 3))
        a = SiameseMLP(3, seed=42).predict(x)
        b = SiameseMLP(3, seed=42).predict(x)
        np.testing.assert_array_equal(a, b)


class TestPairLoss:
    def test_equation_18_cases(self):
        # same side: weight (0.5 - |Ox-Oy|) times distance
        ox, oy, d = np.array([0.7]), np.array([0.6]), np.array([0.8])
        got = SiameseMLP.pair_loss(ox, oy, d)
        assert got[0] == pytest.approx((0.5 - 0.1) * 0.8)
        # opposite sides: zero
        got = SiameseMLP.pair_loss(np.array([0.7]), np.array([0.3]), d)
        assert got[0] == 0.0

    def test_loss_zero_for_identical_sets(self):
        got = SiameseMLP.pair_loss(np.array([0.6]), np.array([0.6]), np.array([0.0]))
        assert got[0] == 0.0


class TestGradients:
    def test_backward_matches_numerical_gradient(self):
        """Finite-difference check of the hand-written backprop through a
        simple scalar objective sum(o)."""
        rng = np.random.default_rng(3)
        m = SiameseMLP(5, seed=1)
        x = rng.normal(size=(7, 5))
        _, cache = m.forward(x)
        grads = m._backward(cache, np.ones(7))
        eps = 1e-6
        for p, g in zip(m._params(), grads):
            idx = tuple(rng.integers(0, s) for s in p.shape)
            orig = p[idx]
            p[idx] = orig + eps
            up = m.forward(x)[0].sum()
            p[idx] = orig - eps
            down = m.forward(x)[0].sum()
            p[idx] = orig
            num = (up - down) / (2 * eps)
            assert g[idx] == pytest.approx(num, rel=1e-4, abs=1e-7)


class TestTraining:
    def _separable_problem(self, n=200, seed=0):
        """Two blobs; pairs within a blob have distance 0, across 1."""
        rng = np.random.default_rng(seed)
        x = np.concatenate(
            [rng.normal(-2, 0.3, size=(n // 2, 4)), rng.normal(2, 0.3, size=(n // 2, 4))]
        )
        label = np.array([0] * (n // 2) + [1] * (n // 2))
        pairs = np.stack(
            [rng.integers(0, n, 600), rng.integers(0, n, 600)], axis=1
        )
        dists = (label[pairs[:, 0]] != label[pairs[:, 1]]).astype(float)
        return x, label, pairs, dists

    def test_training_reduces_loss(self):
        x, _, pairs, dists = self._separable_problem()
        m = SiameseMLP(4, seed=0)
        stats = m.train(x, pairs, dists, epochs=5, seed=0)
        assert stats.epoch_losses[-1] < stats.epoch_losses[0]

    def test_learns_to_separate_blobs(self):
        x, label, pairs, dists = self._separable_problem()
        m = SiameseMLP(4, seed=0)
        m.train(x, pairs, dists, epochs=8, seed=0)
        lab = m.assign(x)
        # assignment should align with the blobs (up to label swap)
        agree = max(np.mean(lab == label), np.mean(lab != label))
        assert agree > 0.9

    def test_assign_degenerate_fallback_splits(self):
        """Even an untrained/degenerate model must split non-trivially."""
        m = SiameseMLP(2, seed=0)
        # force all outputs identical by zeroing the network
        for p in m._params():
            p[...] = 0.0
        x = np.random.default_rng(0).normal(size=(20, 2))
        lab = m.assign(x)
        assert 0 < lab.sum() < 20

    def test_epoch_loss_count(self):
        x, _, pairs, dists = self._separable_problem(n=50)
        m = SiameseMLP(4, seed=0)
        stats = m.train(x, pairs, dists, epochs=3, seed=0)
        assert len(stats.epoch_losses) == 3
