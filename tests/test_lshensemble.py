"""LSH Ensemble index tests: recall against exact containment."""
import numpy as np
import pytest

from repro.index.lshensemble import LSHEnsemble, _best_r, jaccard_for_containment
from repro.sketch.minhash import MinHasher


@pytest.fixture(scope="module")
def hasher():
    return MinHasher(n_hashes=128, seed=7)


@pytest.fixture(scope="module")
def corpus(hasher):
    """Columns of varying sizes drawn from a shared universe."""
    rng = np.random.default_rng(1)
    universe = np.array([f"u{i:05d}" for i in range(5000)])
    sets = {}
    for i, size in enumerate([60, 120, 250, 400, 800, 1500]):
        sets[f"col{i}"] = list(rng.choice(universe, size, replace=False))
    entries = [(cid, hasher.signature_of(v), len(set(v)))
               for cid, v in sets.items()]
    return sets, entries


class TestBanding:
    def test_jaccard_conversion_small_query(self):
        # a small document probing large domains needs a tiny Jaccard bar
        j = jaccard_for_containment(0.5, 20, 1000)
        assert j < 0.02

    def test_jaccard_conversion_equal_sizes(self):
        j = jaccard_for_containment(0.5, 100, 100)
        assert j == pytest.approx(1 / 3)

    def test_best_r_monotone(self):
        # lower Jaccard thresholds need fewer rows per band
        assert _best_r(0.01, 128) <= _best_r(0.5, 128)

    def test_best_r_bounds(self):
        assert _best_r(0.0001, 128) == 1
        assert _best_r(0.99, 128) >= 8


class TestQuery:
    def test_finds_contained_query(self, hasher, corpus):
        sets, entries = corpus
        idx = LSHEnsemble(entries, threshold=0.5)
        rng = np.random.default_rng(2)
        subset = list(rng.choice(sets["col4"], 50, replace=False))
        out = idx.query(hasher.signature_of(subset), 50, k=3)
        assert out and out[0][0] == "col4"
        assert out[0][1] > 0.8

    def test_no_false_positives_above_threshold(self, hasher, corpus):
        sets, entries = corpus
        idx = LSHEnsemble(entries, threshold=0.5)
        probe = [f"zz{i}" for i in range(40)]
        out = idx.query(hasher.signature_of(probe), 40, threshold=0.5)
        assert out == []

    def test_k_truncation(self, hasher, corpus):
        sets, entries = corpus
        idx = LSHEnsemble(entries, threshold=0.3)
        subset = sets["col5"][:100]
        out = idx.query(hasher.signature_of(subset), 100, k=2)
        assert len(out) <= 2

    def test_scores_sorted_descending(self, hasher, corpus):
        sets, entries = corpus
        idx = LSHEnsemble(entries, threshold=0.3)
        subset = sets["col5"][:100]
        out = idx.query(hasher.signature_of(subset), 100, k=6)
        scores = [s for _, s in out]
        assert scores == sorted(scores, reverse=True)

    def test_recall_over_random_probes(self, hasher, corpus):
        """Subsets of indexed columns must be recovered as their own top
        match for a large majority of probes (LSH recall property)."""
        sets, entries = corpus
        idx = LSHEnsemble(entries, threshold=0.5)
        rng = np.random.default_rng(3)
        hits = 0
        trials = 20
        for t in range(trials):
            cid = f"col{t % 6}"
            n = max(10, len(sets[cid]) // 4)
            subset = list(rng.choice(sets[cid], n, replace=False))
            out = idx.query(hasher.signature_of(subset), len(set(subset)), k=1)
            hits += bool(out) and out[0][0] == cid
        assert hits >= trials * 0.8

    def test_empty_entries_rejected(self):
        with pytest.raises(ValueError):
            LSHEnsemble([])

    def test_deterministic(self, hasher, corpus):
        sets, entries = corpus
        idx = LSHEnsemble(entries, threshold=0.4)
        sig = hasher.signature_of(sets["col2"][:80])
        assert idx.query(sig, 80, k=4) == idx.query(sig, 80, k=4)
