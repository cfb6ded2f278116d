"""Joint representation model: numpy MLP trained with triplet margin loss.

Implements the deep model of §4.2: 200-d input (concat of metadata and
content solo embeddings) → hidden layer → 100-d output, L2-normalized
(as in FaceNet [60], which the paper's triplet formulation follows),
trained with the margin loss of Eq. 1 over *aggregated* triplets: the
positive/negative sides of a triplet are the centroids of the aggregated
positive / hard-negative column sets (Fig. 5), so each document yields
exactly one triplet per mini batch.

PyTorch is unavailable offline; forward/backward are hand-derived. The
model is a few 1e4 parameters, so numpy + Adam reproduces the paper's
"converges in ~200 epochs in ~2 minutes" behaviour easily.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class Triplet:
    """One aggregated triplet: anchor index, positive and negative index lists
    into the mini-batch encoding matrix."""

    anchor: int
    positives: list[int]
    negatives: list[int]


class TripletMLP:
    """Two-layer MLP with L2-normalized output and triplet margin loss."""

    def __init__(self, d_in: int = 200, d_hidden: int = 150, d_out: int = 100,
                 *, margin: float = 0.2, lr: float = 1e-3, seed: int = 0):
        g = np.random.default_rng(seed)
        s1 = np.sqrt(2.0 / d_in)
        s2 = np.sqrt(2.0 / d_hidden)
        self.W1 = g.normal(0, s1, (d_in, d_hidden))
        self.b1 = np.zeros(d_hidden)
        self.W2 = g.normal(0, s2, (d_hidden, d_out))
        self.b2 = np.zeros(d_out)
        self.margin = margin
        self.lr = lr
        self._adam = {k: [np.zeros_like(v), np.zeros_like(v)]
                      for k, v in self._params().items()}
        self._t = 0

    def _params(self) -> dict[str, np.ndarray]:
        return {"W1": self.W1, "b1": self.b1, "W2": self.W2, "b2": self.b2}

    # ---- forward -----------------------------------------------------------
    def forward(self, X: np.ndarray, *, cache: bool = False):
        A = X @ self.W1 + self.b1
        H = np.maximum(A, 0.0)
        Y = H @ self.W2 + self.b2
        r = np.linalg.norm(Y, axis=1, keepdims=True)
        r = np.where(r == 0, 1.0, r)
        Z = Y / r
        if cache:
            return Z, (X, A, H, Y, r)
        return Z

    def transform(self, X: np.ndarray) -> np.ndarray:
        """Embed rows of X into the joint space (no grad)."""
        return self.forward(np.atleast_2d(X))

    # ---- training ----------------------------------------------------------
    def train_batch(self, X: np.ndarray, triplets: list[Triplet]) -> float:
        """One gradient step on a mini-batch; returns the mean triplet loss."""
        if not triplets:
            return 0.0
        Z, (X_, A, H, Y, r) = self.forward(X, cache=True)
        dZ = np.zeros_like(Z)
        total = 0.0
        n_active = 0
        for t in triplets:
            za = Z[t.anchor]
            zp = Z[t.positives].mean(axis=0)
            zn = Z[t.negatives].mean(axis=0)
            dp = float(np.sum((za - zp) ** 2))
            dn = float(np.sum((za - zn) ** 2))
            loss = self.margin + dp - dn
            total += max(0.0, loss)
            if loss <= 0:
                continue
            n_active += 1
            dZ[t.anchor] += 2 * (zn - zp)
            gp = -2 * (za - zp) / len(t.positives)
            for i in t.positives:
                dZ[i] += gp
            gn = 2 * (za - zn) / len(t.negatives)
            for i in t.negatives:
                dZ[i] += gn
        mean_loss = total / len(triplets)
        if n_active == 0:
            return mean_loss
        dZ /= len(triplets)
        # back through L2 normalization: dY = (dZ - (dZ·Z)Z) / r
        dot = np.sum(dZ * Z, axis=1, keepdims=True)
        dY = (dZ - dot * Z) / r
        dW2 = H.T @ dY
        db2 = dY.sum(axis=0)
        dH = dY @ self.W2.T
        dA = dH * (A > 0)
        dW1 = X_.T @ dA
        db1 = dA.sum(axis=0)
        self._adam_step({"W1": dW1, "b1": db1, "W2": dW2, "b2": db2})
        return mean_loss

    def _adam_step(self, grads: dict[str, np.ndarray], *, beta1: float = 0.9,
                   beta2: float = 0.999, eps: float = 1e-8) -> None:
        self._t += 1
        params = self._params()
        for k, g in grads.items():
            m, v = self._adam[k]
            m[:] = beta1 * m + (1 - beta1) * g
            v[:] = beta2 * v + (1 - beta2) * g * g
            mh = m / (1 - beta1 ** self._t)
            vh = v / (1 - beta2 ** self._t)
            params[k] -= self.lr * mh / (np.sqrt(vh) + eps)
