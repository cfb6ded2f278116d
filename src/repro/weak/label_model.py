"""Snorkel-substitute: generative label model + discriminative model (§4.1).

The generative model is a Dawid-Skene-style EM over binary LF votes: it
estimates each LF's sensitivity P(vote=1 | related) and specificity
P(vote=0 | unrelated) *from agreements/disagreements alone* — the core
mechanism of Snorkel's generative model — and outputs a probabilistic
label per pair. Pairs never voted 1 by any LF are treated as negatives
without entering EM (paper §4.1 point 4: "the generative model only
considers those pairs that are labeled 1 by at least one LF").

The discriminator is a numpy logistic regression over similarity
features of the pair, trained with (soft-label) cross-entropy so the
model generalizes beyond the probed pairs, producing the final
relatedness degree in [0, 1].
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class GenerativeModel:
    """EM estimator of LF accuracies and posterior labels."""

    n_iter: int = 60
    tol: float = 1e-6
    prior: float = field(default=0.1, repr=False)
    sens: np.ndarray | None = None   # P(vote=1 | y=1) per LF
    spec: np.ndarray | None = None   # P(vote=0 | y=0) per LF
    pi: float = 0.1                  # P(y=1)

    def fit_predict(self, votes: np.ndarray) -> np.ndarray:
        """Posterior P(y=1 | votes) for each row of the vote matrix."""
        votes = np.asarray(votes, dtype=np.float64)
        n, m = votes.shape
        active = votes.sum(axis=1) > 0
        post = np.zeros(n)
        if not active.any():
            self.sens = np.full(m, 0.5)
            self.spec = np.full(m, 0.5)
            return post
        v = votes[active]
        # init from vote agreement
        mu = v.mean(axis=1)
        sens = np.full(m, 0.7)
        spec = np.full(m, 0.7)
        pi = float(np.clip(mu.mean(), 0.05, 0.95))
        eps = 1e-6
        prev = None
        for _ in range(self.n_iter):
            log_p1 = (np.log(pi + eps)
                      + v @ np.log(sens + eps)
                      + (1 - v) @ np.log(1 - sens + eps))
            log_p0 = (np.log(1 - pi + eps)
                      + v @ np.log(1 - spec + eps)
                      + (1 - v) @ np.log(spec + eps))
            mx = np.maximum(log_p1, log_p0)
            p1 = np.exp(log_p1 - mx)
            p0 = np.exp(log_p0 - mx)
            gamma = p1 / (p1 + p0)
            pi = float(np.clip(gamma.mean(), 0.01, 0.99))
            w1 = gamma.sum() + eps
            w0 = (1 - gamma).sum() + eps
            sens = np.clip((gamma[:, None] * v).sum(axis=0) / w1, 0.05, 0.95)
            spec = np.clip(((1 - gamma)[:, None] * (1 - v)).sum(axis=0) / w0, 0.05, 0.95)
            if prev is not None and np.abs(gamma - prev).max() < self.tol:
                break
            prev = gamma
        self.sens, self.spec, self.pi = sens, spec, pi
        post[active] = gamma
        return post


@dataclass
class Discriminator:
    """Logistic regression trained on probabilistic labels (numpy)."""

    lr: float = 0.5
    n_iter: int = 400
    l2: float = 1e-3
    w: np.ndarray | None = None
    b: float = 0.0
    mean_: np.ndarray | None = None
    std_: np.ndarray | None = None

    @staticmethod
    def _sigmoid(z: np.ndarray) -> np.ndarray:
        return 1.0 / (1.0 + np.exp(-np.clip(z, -30, 30)))

    def fit(self, X: np.ndarray, y: np.ndarray) -> "Discriminator":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64)
        self.mean_ = X.mean(axis=0)
        self.std_ = X.std(axis=0)
        self.std_[self.std_ == 0] = 1.0
        Xs = (X - self.mean_) / self.std_
        n, d = Xs.shape
        w = np.zeros(d)
        b = 0.0
        for _ in range(self.n_iter):
            p = self._sigmoid(Xs @ w + b)
            g = p - y
            gw = Xs.T @ g / n + self.l2 * w
            gb = g.mean()
            w -= self.lr * gw
            b -= self.lr * gb
        self.w, self.b = w, b
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        Xs = (np.asarray(X, dtype=np.float64) - self.mean_) / self.std_
        return self._sigmoid(Xs @ self.w + self.b)
