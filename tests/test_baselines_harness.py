"""Baseline wrappers + harness table runs + renderer tests."""
import pandas as pd
import pytest

from repro.baselines import aurum, d3l
from repro.discovery.joinability import JoinIndex
from repro.discovery.unionability import UnionIndex
from repro.eval import harness, tables


class TestBaselineWrappers:
    @pytest.fixture(scope="class")
    def jindex(self, pharma_profile, benches):
        return JoinIndex(pharma_profile, benches["2B"].candidate_cols)

    @pytest.fixture(scope="class")
    def uindex(self, pharma_profile, benches):
        return UnionIndex(pharma_profile, benches["3B"].queries)

    def test_aurum_join_is_jaccard(self, jindex):
        assert aurum.join_rank(jindex, "drugs.drug_id", k=5) == \
            jindex.rank("drugs.drug_id", method="jaccard", k=5)

    def test_d3l_join_is_weighted_euclidean(self, jindex):
        assert d3l.join_rank(jindex, "drugs.drug_id", k=5) == \
            jindex.rank("drugs.drug_id", method="d3l", k=5)

    def test_aurum_union_combiner(self, uindex):
        t = uindex.tables[0]
        assert aurum.union_rank(uindex, t, k=3) == \
            uindex.rank(t, k=3, combiner="aurum")

    def test_d3l_union_combiner(self, uindex):
        t = uindex.tables[0]
        assert d3l.union_rank(uindex, t, k=3) == \
            uindex.rank(t, k=3, combiner="d3l")

    def test_aurum_pkfk_config(self, pharma_profile):
        links = aurum.pkfk_links(pharma_profile, collection="drugbank")
        assert isinstance(links, set)


class TestHarnessTables:
    def test_table1(self):
        df = harness.run_table1()
        assert set(df["data_lake"]) == {"pharma", "ukopen", "mlopen"}
        assert (df["n_des"] > 0).all()
        text = df[df["format"] == "Text"]
        assert (text["n_tables"] == 0).all()

    def test_table2(self):
        df = harness.run_table2()
        assert len(df) == 13

    def test_table3_shape(self, spark):
        df = harness.run_table3(spark, ("2B",))
        row = df.iloc[0]
        assert row["CMDL"] > row["Aurum"]  # containment wins under skew

    def test_table4_chebi_identical(self, spark):
        df = harness.run_table4(spark).set_index("database")
        assert df.loc["chebi", "Aurum_precision"] == \
            df.loc["chebi", "CMDL_precision"]
        assert df.loc["chebi", "Aurum_recall"] == df.loc["chebi", "CMDL_recall"]

    def test_table4_drugbank_shape(self, spark):
        df = harness.run_table4(spark).set_index("database")
        assert df.loc["drugbank", "CMDL_recall"] > \
            df.loc["drugbank", "Aurum_recall"] + 0.3
        assert df.loc["drugbank", "Aurum_precision"] >= \
            df.loc["drugbank", "CMDL_precision"]

    def test_table5_shape(self, spark):
        df = harness.run_table5(spark)
        rr = df[df["metric"] == "RR"].set_index("benchmark")
        # 3A: name strongest; 3B: semantic strongest, numeric tiny
        assert rr.loc["3A", "name"] >= rr.loc["3A", "semantic"]
        assert rr.loc["3B", "semantic"] >= rr.loc["3B", "containment"]
        assert rr.loc["3B", "numeric"] < 0.3

    def test_table6_ordering(self, spark):
        df = harness.run_table6(spark, n_queries=60, replicate=128)
        qps = df.set_index("labeling_function")["throughput_qps"]
        assert qps["Semantic"] > qps["Content search"]
        assert qps["Semantic"] > qps["Containment"]


class TestRenderers:
    def test_all_renderers_produce_text(self, spark):
        outputs = [
            tables.render_table1(harness.run_table1()),
            tables.render_table2(harness.run_table2()),
            tables.render_table3(harness.run_table3(spark, ("2B",))),
            tables.render_table4(harness.run_table4(spark)),
            tables.render_table6(harness.run_table6(spark, n_queries=30,
                                                    replicate=16)),
        ]
        for out in outputs:
            assert isinstance(out, str) and "paper" in out

    def test_render_table5(self, spark):
        out = tables.render_table5(harness.run_table5(spark))
        assert "ensemble" in out and "paper_semantic" in out

    def test_paper_constants_cover_benchmarks(self):
        assert set(tables.PAPER_TABLE3) == {"2A", "2B", "2C-SS", "2C-MS",
                                            "2C-LS"}
        assert set(tables.PAPER_TABLE4) == {"drugbank", "chembl", "chebi"}
