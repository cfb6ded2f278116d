"""PK-FK discovery engine tests (paper §6.2, Table 4 mechanics)."""
import pytest

from repro.discovery.pkfk import (AURUM_PKFK, CMDL_PKFK, PkfkConfig,
                                  discover_pkfk, undirected)


@pytest.fixture(scope="module")
def cmdl_links(pharma_profile):
    return discover_pkfk(pharma_profile, collection="drugbank",
                         config=CMDL_PKFK)


@pytest.fixture(scope="module")
def aurum_links(pharma_profile):
    return discover_pkfk(pharma_profile, collection="drugbank",
                         config=AURUM_PKFK)


class TestConfigs:
    def test_cmdl_uses_containment_and_schema_filter(self):
        assert CMDL_PKFK.measure == "containment"
        assert CMDL_PKFK.use_name_filter

    def test_aurum_uses_jaccard_strict_keys(self):
        assert AURUM_PKFK.measure == "jaccard"
        assert AURUM_PKFK.key_ratio > CMDL_PKFK.key_ratio
        assert not AURUM_PKFK.use_name_filter


class TestStringPath:
    def test_cmdl_finds_clean_fk(self, cmdl_links):
        assert ("trials.drug_id", "drugs.drug_id") in cmdl_links

    def test_cmdl_misses_dirty_fk(self, cmdl_links):
        """adverse_events.drug_id has ~35% out-of-domain values →
        containment below threshold → not discovered (recall loss,
        matching the paper's 'CMDL recall < 1' on DrugBank)."""
        assert ("adverse_events.drug_id", "drugs.drug_id") not in cmdl_links

    def test_cmdl_name_filter_blocks_odd_names(self, cmdl_links):
        """brands.maker ⊆ manufacturers.mfr_id has full containment but
        dissimilar names — CMDL's schema filter rejects it."""
        assert ("brands.maker", "manufacturers.mfr_id") not in cmdl_links

    def test_cmdl_nested_fk_false_positives(self, cmdl_links, benches):
        """The lenient key test admits near-unique FK columns as PKs,
        producing fk→fk links not in the ground truth (the paper's
        stated cause of CMDL's low DrugBank precision)."""
        gt = undirected({(r.fk_col_id, r.pk_col_id) for r in
                         benches["2D-drugbank"].gt_links.itertuples()})
        fps = undirected(cmdl_links) - gt
        assert len(fps) >= 5

    def test_aurum_finds_similar_size_fk(self, aurum_links):
        assert ("proteins.gene_id", "gene_targets.gene_id") in aurum_links

    def test_aurum_misses_skewed_fk(self, aurum_links):
        assert ("trials.drug_id", "drugs.drug_id") not in aurum_links

    def test_aurum_no_dup_key_pk(self, aurum_links):
        """Columns with duplicates fail the strict key ratio, so nothing
        links *to* them."""
        pks = {p for _, p in aurum_links}
        assert "drug_interactions.drug_id_a" not in pks


class TestNumericPath:
    def test_chebi_identical_between_systems(self, pharma_profile):
        """ChEBI keys are numeric; both systems share the numeric-overlap
        path, so their discovered sets must be exactly equal (the paper's
        Table 4 ChEBI rows are identical for the same reason)."""
        a = discover_pkfk(pharma_profile, collection="chebi", config=AURUM_PKFK)
        c = discover_pkfk(pharma_profile, collection="chebi", config=CMDL_PKFK)
        assert a == c

    def test_chebi_finds_clean_numeric_fk(self, pharma_profile):
        links = discover_pkfk(pharma_profile, collection="chebi")
        assert ("chebi_relations.init_id", "chebi_compounds.chebi_id") in links

    def test_chebi_misses_out_of_range_fk(self, pharma_profile):
        links = discover_pkfk(pharma_profile, collection="chebi")
        assert ("chebi_names.chebi_id_ref", "chebi_compounds.chebi_id") not in links

    def test_real_valued_columns_excluded(self, pharma_profile):
        links = discover_pkfk(pharma_profile, collection="chebi")
        assert not any("mass" in l[0] or "mass" in l[1] for l in links)


class TestChembl:
    def test_cmdl_better_precision_via_schema_filter(self, pharma_profile, benches):
        """Aurum links the schema-less near-unique compound columns
        (parent_molregno etc.); CMDL's name filter rejects them."""
        gt = undirected({(r.fk_col_id, r.pk_col_id) for r in
                         benches["2D-chembl"].gt_links.itertuples()})
        a = undirected(discover_pkfk(pharma_profile, collection="chembl",
                                     config=AURUM_PKFK))
        c = undirected(discover_pkfk(pharma_profile, collection="chembl",
                                     config=CMDL_PKFK))
        prec = lambda found: len(found & gt) / len(found) if found else 0.0
        assert prec(c) > prec(a)


class TestHelpers:
    def test_undirected(self):
        assert undirected({("a", "b"), ("b", "a")}) == {frozenset({"a", "b"})}

    def test_collection_scoping(self, pharma_profile):
        links = discover_pkfk(pharma_profile, collection="drugbank")
        for f, p in links:
            assert not f.startswith("chebi") and not p.startswith("chebi")

    def test_custom_config(self, pharma_profile):
        strict = PkfkConfig(measure="containment", threshold=0.99,
                            key_ratio=0.99, use_name_filter=True)
        loose = PkfkConfig(measure="containment", threshold=0.5,
                           key_ratio=0.8, use_name_filter=False)
        n_strict = len(discover_pkfk(pharma_profile, collection="drugbank",
                                     config=strict))
        n_loose = len(discover_pkfk(pharma_profile, collection="drugbank",
                                    config=loose))
        assert n_strict < n_loose
