"""Minwise-hashing sketches with Jaccard and set-containment estimators.

Implements the sketch layer the paper builds on [69]: per-DE minhash
signatures computed distributed in Spark, plus estimators for Jaccard
similarity and the asymmetric Jaccard set containment |A∩B|/|A| that
CMDL prefers (§3). Containment is derived from the Jaccard estimate and
the exact set cardinalities stored next to each signature, exactly as
LSH Ensemble does.

Hash family: h_i(x) = (a_i * H32(x) + b_i) mod p over a 32-bit base hash
of the element string, with p prime > 2^32 and a_i < 2^31 so products
fit in uint64 without overflow.
"""
from __future__ import annotations

import hashlib
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.types import (ArrayType, LongType, StringType, StructField,
                               StructType)

_P = np.uint64(4294967311)  # prime > 2^32


def base_hash(values: "pd.Series | list[str]") -> np.ndarray:
    """Stable 32-bit base hash of strings (uint64 dtype for arithmetic)."""
    out = np.empty(len(values), dtype=np.uint64)
    for i, v in enumerate(values):
        d = hashlib.blake2b(str(v).encode(), digest_size=4).digest()
        out[i] = int.from_bytes(d, "big")
    return out


@dataclass
class MinHasher:
    """A family of ``n_hashes`` minwise hash functions, seeded."""

    n_hashes: int = 128
    seed: int = 7
    a: np.ndarray = field(init=False, repr=False)
    b: np.ndarray = field(init=False, repr=False)

    def __post_init__(self):
        g = np.random.default_rng(self.seed)
        self.a = g.integers(1, 2**31, self.n_hashes, dtype=np.uint64)
        self.b = g.integers(0, 2**31, self.n_hashes, dtype=np.uint64)

    def signature(self, hashed_elems: np.ndarray) -> np.ndarray:
        """Signature (n_hashes,) over pre-hashed elements (uint64)."""
        if hashed_elems.size == 0:
            return np.full(self.n_hashes, np.iinfo(np.int64).max, dtype=np.int64)
        h = hashed_elems.astype(np.uint64)
        # (H, n) = a[:,None]*h[None,:] + b — all < 2^63, no overflow
        m = (self.a[:, None] * h[None, :] + self.b[:, None]) % _P
        return m.min(axis=1).astype(np.int64)

    def signature_of(self, elems: list[str]) -> np.ndarray:
        return self.signature(base_hash(list(dict.fromkeys(elems))))


_SIG_SCHEMA = StructType([
    StructField("de_id", StringType()),
    StructField("sig", ArrayType(LongType())),
    StructField("n_distinct", LongType()),
])


def signatures_spark(values: DataFrame, hasher: MinHasher, *,
                     id_col: str = "de_id", elem_col: str = "value") -> DataFrame:
    """Distributed signatures: (id, elem) → (de_id, sig, n_distinct)."""
    a, b, n_hashes = hasher.a, hasher.b, hasher.n_hashes

    def _sig(pdf: pd.DataFrame) -> pd.DataFrame:
        local = MinHasher.__new__(MinHasher)
        local.n_hashes, local.a, local.b = n_hashes, a, b
        elems = pdf[elem_col].astype(str).drop_duplicates()
        sig = local.signature(base_hash(elems))
        return pd.DataFrame({
            "de_id": [str(pdf[id_col].iloc[0])],
            "sig": [sig.tolist()],
            "n_distinct": [len(elems)],
        })

    return (
        values.select(id_col, elem_col)
        .groupBy(id_col)
        .applyInPandas(_sig, schema=_SIG_SCHEMA)
    )


def est_jaccard(sig_a: np.ndarray, sig_b: np.ndarray) -> float:
    """Minhash Jaccard estimate: fraction of agreeing signature slots."""
    return float(np.mean(np.asarray(sig_a) == np.asarray(sig_b)))


def est_containment(sig_a: np.ndarray, n_a: int, sig_b: np.ndarray, n_b: int) -> float:
    """Estimated |A∩B|/|A| from signatures + exact cardinalities [69]."""
    if n_a == 0:
        return 0.0
    j = est_jaccard(sig_a, sig_b)
    inter = j * (n_a + n_b) / (1.0 + j)
    return float(min(1.0, inter / n_a))


def pairwise_jaccard(sigs: np.ndarray) -> np.ndarray:
    """All-pairs Jaccard estimates for a (n, H) signature matrix."""
    n = sigs.shape[0]
    out = np.empty((n, n))
    for i in range(n):
        out[i] = (sigs == sigs[i]).mean(axis=1)
    return out


def pairwise_containment(sigs: np.ndarray, sizes: np.ndarray) -> np.ndarray:
    """All-pairs containment C[i, j] ≈ |A_i ∩ A_j| / |A_i|."""
    j = pairwise_jaccard(sigs)
    sz = sizes.astype("float64")
    inter = j * (sz[:, None] + sz[None, :]) / (1.0 + j)
    with np.errstate(divide="ignore", invalid="ignore"):
        c = np.where(sz[:, None] > 0, inter / sz[:, None], 0.0)
    return np.clip(c, 0.0, 1.0)
