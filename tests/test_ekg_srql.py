"""EKG materialization and SRQL discovery-interface tests (paper §5)."""
import pytest

from repro.discovery.ekg import (EDGE_COLUMNS, build_ekg, containment_edges,
                                 pkfk_edges, semantic_edges, union_edges)
from repro.discovery.srql import DRS, CMDLSystem


class TestEkg:
    def test_semantic_edges(self, pharma_profile):
        edges = semantic_edges(pharma_profile, k=3)
        assert list(edges.columns) == EDGE_COLUMNS
        assert (edges["rel"] == "semantic").all()
        assert (edges["src"] != edges["dst"]).all()

    def test_containment_edges_threshold(self, pharma_profile):
        edges = containment_edges(pharma_profile, threshold=0.8)
        assert (edges["weight"] >= 0.8).all()

    def test_containment_includes_fk_edge(self, pharma_profile):
        edges = containment_edges(pharma_profile, threshold=0.8)
        pairs = {frozenset((r.src, r.dst)) for r in edges.itertuples()}
        assert frozenset(("trials.drug_id", "drugs.drug_id")) in pairs

    def test_pkfk_edges(self, pharma_profile):
        edges = pkfk_edges(pharma_profile)
        assert len(edges) > 0
        assert (edges["rel"] == "pkfk").all()

    def test_union_edges(self, pharma_profile, benches):
        edges = union_edges(pharma_profile, benches["3B"].queries)
        assert (edges["rel"] == "union").all()

    def test_build_ekg_has_all_types(self, pharma_profile, benches):
        ekg = build_ekg(pharma_profile, union_tables=benches["3B"].queries)
        assert {"semantic", "containment", "pkfk", "union"} <= set(ekg["rel"])


class TestDRS:
    def test_one_based_indexing(self):
        drs = DRS([("a", 0.9), ("b", 0.8)], "p")
        assert drs[1] == "a" and drs[2] == "b"

    def test_len_and_ids(self):
        drs = DRS([("a", 1.0)], "p")
        assert len(drs) == 1 and drs.ids() == ["a"]


class TestCMDLSystem:
    @pytest.fixture(scope="class")
    def system(self, pharma_profile, benches):
        return CMDLSystem(pharma_profile, union_tables=benches["3B"].queries)

    def test_content_search_text_mode(self, system, pharma):
        # query with a token known to occur in documents
        doc = pharma.docs.iloc[0]
        word = doc["text"].split()[0]
        r = system.content_search(word, mode="Text", topn=5)
        assert len(r) >= 1

    def test_content_search_table_mode(self, system):
        r = system.content_search("drug00001", mode="Table", topn=5)
        assert any(c.startswith(("drugs.", "enzyme_targets.", "brands.",
                                 "dosages.", "indications.", "drug_"))
                   or "drug" in c for c, _ in r.items)

    def test_cross_modal_search_doc_id(self, system, pharma):
        doc_id = pharma.docs.iloc[0]["doc_id"]
        r = system.crossModal_search(doc_id, topn=3)
        assert 1 <= len(r) <= 3

    def test_cross_modal_search_free_text(self, system):
        r = system.crossModal_search("enzyme00001 enzymeterm00", topn=3)
        assert len(r) >= 1

    def test_pkfk_api(self, system):
        r = system.pkfk("drugs", topn=3)
        assert len(r) >= 1
        assert "drugs" not in r.ids()

    def test_unionable_api(self, system, benches):
        q = benches["3B"].queries[0]
        r = system.unionable(q, topn=2)
        assert len(r) <= 2

    def test_motivation_pipeline(self, system, pharma):
        """The Fig. 1 / §5.2 five-step discovery pipeline end to end:
        keyword search → crossModal → crossModal → pkfk → unionable."""
        seed_doc = pharma.docs.iloc[1]
        keyword = seed_doc["text"].split()[0]
        r1 = system.content_search(keyword, mode="Text", topn=3)
        assert len(r1) >= 1
        r2 = system.crossModal_search(r1[1], topn=3)
        assert len(r2) >= 1
        r3 = system.crossModal_search(r1[min(2, len(r1))], topn=3)
        assert len(r3) >= 1
        r4 = system.pkfk(r2[1], topn=2)
        r5_src = r4[1] if len(r4) else r2[1]
        r5 = system.unionable(r5_src, topn=2)
        assert isinstance(r5, DRS)

    def test_provenance_recorded(self, system):
        r = system.content_search("anything", mode="Text")
        assert "content_search" in r.provenance
