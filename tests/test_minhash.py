"""Unit + accuracy tests for the minwise-hashing sketch substrate."""
import numpy as np
import pandas as pd
import pytest

from repro.sketch.minhash import (MinHasher, base_hash, est_containment,
                                  est_jaccard, pairwise_containment,
                                  pairwise_jaccard, signatures_spark)


@pytest.fixture(scope="module")
def hasher():
    return MinHasher(n_hashes=128, seed=7)


def _sets(rng, n_a, n_b, n_inter):
    universe = [f"v{i:05d}" for i in range(20000)]
    rng.shuffle(universe)
    inter = universe[:n_inter]
    a = inter + universe[n_inter:n_inter + (n_a - n_inter)]
    b = inter + universe[n_inter + (n_a - n_inter):
                         n_inter + (n_a - n_inter) + (n_b - n_inter)]
    return a, b


class TestSignature:
    def test_deterministic(self, hasher):
        s1 = hasher.signature_of(["a", "b", "c"])
        s2 = hasher.signature_of(["a", "b", "c"])
        assert np.array_equal(s1, s2)

    def test_order_invariant(self, hasher):
        assert np.array_equal(hasher.signature_of(["a", "b", "c"]),
                              hasher.signature_of(["c", "a", "b"]))

    def test_duplicate_invariant(self, hasher):
        assert np.array_equal(hasher.signature_of(["a", "a", "b"]),
                              hasher.signature_of(["a", "b"]))

    def test_length(self, hasher):
        assert hasher.signature_of(["a"]).shape == (128,)

    def test_empty_set(self, hasher):
        s = hasher.signature(np.array([], dtype=np.uint64))
        assert s.shape == (128,)

    def test_different_seeds_differ(self):
        a = MinHasher(n_hashes=16, seed=1).signature_of(["a", "b"])
        b = MinHasher(n_hashes=16, seed=2).signature_of(["a", "b"])
        assert not np.array_equal(a, b)

    def test_base_hash_stable(self):
        h1 = base_hash(["x", "y"])
        h2 = base_hash(pd.Series(["x", "y"]))
        assert np.array_equal(h1, h2)


class TestEstimators:
    def test_identical_sets(self, hasher):
        s = hasher.signature_of([f"v{i}" for i in range(100)])
        assert est_jaccard(s, s) == 1.0
        assert est_containment(s, 100, s, 100) == pytest.approx(1.0)

    def test_disjoint_sets(self, hasher):
        a = hasher.signature_of([f"a{i}" for i in range(100)])
        b = hasher.signature_of([f"b{i}" for i in range(100)])
        assert est_jaccard(a, b) < 0.1

    @pytest.mark.parametrize("n_a,n_b,n_inter", [
        (100, 100, 50), (50, 500, 50), (200, 1000, 100), (300, 300, 240),
    ])
    def test_jaccard_accuracy(self, hasher, n_a, n_b, n_inter):
        rng = np.random.default_rng(n_a * 7 + n_b)
        a, b = _sets(rng, n_a, n_b, n_inter)
        true_j = n_inter / (n_a + n_b - n_inter)
        est = est_jaccard(hasher.signature_of(a), hasher.signature_of(b))
        assert est == pytest.approx(true_j, abs=0.12)

    @pytest.mark.parametrize("n_a,n_b,n_inter,tol", [
        (50, 500, 50, 0.15),     # full containment under heavy skew
        (100, 100, 50, 0.15),
    ])
    def test_containment_accuracy(self, hasher, n_a, n_b, n_inter, tol):
        rng = np.random.default_rng(n_a + n_b)
        a, b = _sets(rng, n_a, n_b, n_inter)
        true_c = n_inter / n_a
        est = est_containment(hasher.signature_of(a), n_a,
                              hasher.signature_of(b), n_b)
        assert est == pytest.approx(true_c, abs=tol)

    def test_containment_monotone_under_skew(self, hasher):
        """In the skewed regime the Jaccard→containment conversion has
        high variance [69]; absolute accuracy degrades but the estimator
        must still *order* high- vs low-containment pairs correctly —
        which is all the discovery ranking relies on."""
        rng = np.random.default_rng(99)
        a_hi, b = _sets(rng, 100, 1000, 80)
        a_lo, _ = _sets(np.random.default_rng(98), 100, 1000, 20)
        sb = hasher.signature_of(b)
        hi = est_containment(hasher.signature_of(a_hi), 100, sb, 1000)
        # a_lo shares nothing with this b (different universe shuffle)
        lo = est_containment(hasher.signature_of(a_lo), 100, sb, 1000)
        assert hi > lo

    def test_containment_asymmetry(self, hasher):
        rng = np.random.default_rng(0)
        a, b = _sets(rng, 50, 500, 50)
        sa, sb = hasher.signature_of(a), hasher.signature_of(b)
        assert est_containment(sa, 50, sb, 500) > est_containment(sb, 500, sa, 50)

    def test_containment_empty_query(self, hasher):
        s = hasher.signature_of(["a"])
        assert est_containment(s, 0, s, 1) == 0.0


class TestPairwise:
    @pytest.fixture(scope="class")
    def sig_matrix(self, hasher):
        rng = np.random.default_rng(3)
        sets = []
        base = [f"u{i:04d}" for i in range(400)]
        sets.append(base[:200])
        sets.append(base[:100])          # contained in the first
        sets.append(base[200:400])       # disjoint from the second
        sigs = np.stack([hasher.signature_of(s) for s in sets])
        sizes = np.array([len(s) for s in sets])
        return sigs, sizes

    def test_jaccard_diagonal(self, sig_matrix):
        sigs, _ = sig_matrix
        assert np.allclose(np.diag(pairwise_jaccard(sigs)), 1.0)

    def test_jaccard_symmetric(self, sig_matrix):
        sigs, _ = sig_matrix
        j = pairwise_jaccard(sigs)
        assert np.allclose(j, j.T)

    def test_containment_direction(self, sig_matrix):
        sigs, sizes = sig_matrix
        c = pairwise_containment(sigs, sizes)
        # set1 (100) fully inside set0 (200): C[1,0] ~ 1, C[0,1] ~ 0.5
        assert c[1, 0] == pytest.approx(1.0, abs=0.1)
        assert c[0, 1] == pytest.approx(0.5, abs=0.12)

    def test_containment_bounds(self, sig_matrix):
        sigs, sizes = sig_matrix
        c = pairwise_containment(sigs, sizes)
        assert (c >= 0).all() and (c <= 1).all()


class TestSparkSignatures:
    def test_matches_driver_signatures(self, spark, hasher):
        pdf = pd.DataFrame({
            "de_id": ["c1"] * 50 + ["c2"] * 30,
            "value": [f"a{i}" for i in range(50)] + [f"b{i}" for i in range(30)],
        })
        out = signatures_spark(spark.createDataFrame(pdf), hasher)
        rows = {r["de_id"]: r for r in out.collect()}
        for cid, elems in (("c1", [f"a{i}" for i in range(50)]),
                           ("c2", [f"b{i}" for i in range(30)])):
            assert np.array_equal(np.array(rows[cid]["sig"]),
                                  hasher.signature_of(elems))
            assert rows[cid]["n_distinct"] == len(elems)

    def test_duplicates_collapse(self, spark, hasher):
        pdf = pd.DataFrame({"de_id": ["c"] * 4, "value": ["x", "x", "y", "y"]})
        out = signatures_spark(spark.createDataFrame(pdf), hasher).collect()
        assert out[0]["n_distinct"] == 2
