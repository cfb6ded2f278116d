"""Generative label model (EM) and discriminator tests."""
import numpy as np
import pytest

from repro.weak.label_model import Discriminator, GenerativeModel


def _planted_votes(rng, n, sens, spec, prior=0.2):
    """Simulate LF votes with planted sensitivities/specificities."""
    y = (rng.random(n) < prior).astype(int)
    m = len(sens)
    votes = np.zeros((n, m), dtype=np.int8)
    for j in range(m):
        p1 = np.where(y == 1, sens[j], 1 - spec[j])
        votes[:, j] = rng.random(n) < p1
    return y, votes


class TestGenerativeModel:
    def test_recovers_planted_labels(self):
        rng = np.random.default_rng(0)
        y, votes = _planted_votes(rng, 3000, [0.9, 0.85, 0.8, 0.7],
                                  [0.95, 0.9, 0.92, 0.85])
        post = GenerativeModel().fit_predict(votes)
        pred = (post >= 0.5).astype(int)
        acc = (pred == y).mean()
        assert acc > 0.85

    def test_estimates_lf_quality_ordering(self):
        rng = np.random.default_rng(1)
        y, votes = _planted_votes(rng, 5000, [0.95, 0.55], [0.95, 0.6])
        gm = GenerativeModel()
        gm.fit_predict(votes)
        # the good LF should be recognized as more sensitive+specific
        assert gm.sens[0] + gm.spec[0] > gm.sens[1] + gm.spec[1]

    def test_all_zero_votes_are_negative(self):
        votes = np.zeros((10, 3), dtype=np.int8)
        post = GenerativeModel().fit_predict(votes)
        assert (post == 0).all()

    def test_only_positive_voted_rows_enter_em(self):
        votes = np.array([[0, 0], [1, 0], [1, 1]], dtype=np.int8)
        post = GenerativeModel().fit_predict(votes)
        assert post[0] == 0.0
        assert post[2] >= post[1]

    def test_posteriors_are_probabilities(self):
        rng = np.random.default_rng(2)
        _, votes = _planted_votes(rng, 500, [0.8, 0.7], [0.9, 0.8])
        post = GenerativeModel().fit_predict(votes)
        assert ((post >= 0) & (post <= 1)).all()

    def test_deterministic(self):
        rng = np.random.default_rng(3)
        _, votes = _planted_votes(rng, 500, [0.8, 0.7], [0.9, 0.8])
        assert np.allclose(GenerativeModel().fit_predict(votes),
                           GenerativeModel().fit_predict(votes))


class TestDiscriminator:
    def test_learns_separable_data(self):
        rng = np.random.default_rng(0)
        X = rng.standard_normal((600, 4))
        y = (X[:, 0] + X[:, 1] > 0).astype(float)
        d = Discriminator().fit(X, y)
        acc = ((d.predict_proba(X) >= 0.5) == y).mean()
        assert acc > 0.9

    def test_accepts_soft_labels(self):
        rng = np.random.default_rng(1)
        X = rng.standard_normal((400, 3))
        y_soft = 1 / (1 + np.exp(-3 * X[:, 0])) * 0.9
        d = Discriminator().fit(X, y_soft)
        p = d.predict_proba(X)
        assert np.corrcoef(p, y_soft)[0, 1] > 0.8

    def test_output_range(self):
        rng = np.random.default_rng(2)
        X = rng.standard_normal((100, 2))
        d = Discriminator().fit(X, (X[:, 0] > 0).astype(float))
        p = d.predict_proba(X * 100)
        assert ((p >= 0) & (p <= 1)).all()

    def test_constant_feature_safe(self):
        X = np.ones((50, 2))
        X[:, 1] = np.arange(50)
        y = (X[:, 1] > 25).astype(float)
        d = Discriminator().fit(X, y)
        assert np.isfinite(d.predict_proba(X)).all()

    def test_generalizes_beyond_training(self):
        rng = np.random.default_rng(3)
        X = rng.standard_normal((500, 2))
        y = (X[:, 0] > 0).astype(float)
        d = Discriminator().fit(X[:400], y[:400])
        acc = ((d.predict_proba(X[400:]) >= 0.5) == y[400:]).mean()
        assert acc > 0.9
