"""Syntactic join discovery tests (JoinIndex; paper §6.2)."""
import numpy as np
import pytest

from repro.discovery.joinability import METHODS, JoinIndex


@pytest.fixture(scope="module")
def index(pharma_profile, benches):
    return JoinIndex(pharma_profile, benches["2B"].candidate_cols)


class TestJoinIndex:
    def test_matrices_shapes(self, index):
        n = len(index.cols)
        assert index.containment.shape == (n, n)
        assert index.jaccard.shape == (n, n)
        assert index.name_sim.shape == (n, n)

    def test_containment_diagonal(self, index):
        assert np.allclose(np.diag(index.containment), 1.0)

    def test_rank_excludes_self_and_same_table(self, index):
        q = "drugs.drug_id"
        for c, _ in index.rank(q):
            assert c != q
            assert index.tables[c] != "drugs"

    def test_rank_sorted(self, index):
        ranked = index.rank("drugs.drug_id", method="containment")
        scores = [s for _, s in ranked]
        assert scores == sorted(scores, reverse=True)

    def test_k_truncation(self, index):
        assert len(index.rank("drugs.drug_id", k=3)) == 3

    @pytest.mark.parametrize("method", METHODS)
    def test_all_methods_run(self, index, method):
        out = index.rank("drugs.drug_id", method=method, k=5)
        assert len(out) == 5

    def test_unknown_method(self, index):
        with pytest.raises(ValueError):
            index.rank("drugs.drug_id", method="bogus")

    def test_containment_finds_fk(self, index):
        """trials.drug_id ⊆ drugs.drug_id: containment ranking must place
        the PK column first even though their Jaccard is tiny."""
        ranked = index.rank("trials.drug_id", method="containment", k=8)
        assert "drugs.drug_id" in [c for c, _ in ranked]

    def test_jaccard_misses_skewed_fk(self, index):
        """Aurum's symmetric Jaccard demotes the heavily skewed true pair
        below similarly-sized siblings (the paper's 2B mechanism)."""
        cont_rank = [c for c, _ in index.rank("trials.drug_id",
                                              method="containment")]
        jac_rank = [c for c, _ in index.rank("trials.drug_id",
                                             method="jaccard")]
        assert jac_rank.index("drugs.drug_id") > cont_rank.index("drugs.drug_id")

    def test_d3l_name_signal_demotes_odd_names(self, index):
        """D3L's name distance pushes the dissimilarly-named decoy below
        same-named candidates relative to pure Jaccard."""
        q = "trials.drug_id"
        jac = [c for c, _ in index.rank(q, method="jaccard")]
        d3l = [c for c, _ in index.rank(q, method="d3l")]
        decoy = "comedications.comed_ref"
        if decoy in jac and decoy in d3l:
            assert d3l.index(decoy) >= jac.index(decoy)

    def test_symmetric_direction_max(self, index):
        """rank() uses max of both containment directions, so querying
        from the PK side also finds the FK column."""
        ranked = [c for c, _ in index.rank("drugs.drug_id",
                                           method="containment", k=20)]
        assert "trials.drug_id" in ranked
