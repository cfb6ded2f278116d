"""Synthetic lake generator tests: invariants + DuckDB-oracle checks."""
import numpy as np
import pandas as pd
import pytest

from repro.discovery.exact import exact_containment_spark
from repro.lake.generator import LakeBuilder
from repro.lake.recipes import ALL_LAKES, build_lake
from repro.oracle import assert_equivalent


class TestLakeBuilder:
    @pytest.fixture
    def builder(self):
        b = LakeBuilder("toy", seed=0)
        b.add_topic("fruit", 50)
        b.add_collection("c1", "CSV")
        return b

    def test_topic_vocab_registered(self, builder):
        assert builder.vocab_topics["fruit00000"] == "fruit"
        assert builder.vocab_topics["fruitterm00"] == "fruit"
        assert builder.vocab_topics["fruit"] == "fruit"

    def test_add_str_column(self, builder):
        cid = builder.add_str_column("c1", "t", "c", topic="fruit",
                                     values=builder.pool("fruit", 0, 10))
        lake = builder.build()
        assert cid == "t.c"
        assert len(lake.string_values) == 10
        assert lake.columns.iloc[0]["dtype"] == "str"

    def test_dup_frac_adds_duplicates(self, builder):
        builder.add_str_column("c1", "t", "c", topic="fruit",
                               values=builder.pool("fruit", 0, 20), dup_frac=0.5)
        lake = builder.build()
        assert len(lake.string_values) == 30
        assert lake.string_values["value"].nunique() == 20

    def test_add_num_column_unique_integer(self, builder):
        builder.add_num_column("c1", "t", "n", lo=1, hi=101, n=100,
                               unique=True, integer=True)
        lake = builder.build()
        v = lake.numeric_values["value"]
        assert v.nunique() == 100
        assert (v == v.round()).all()

    def test_num_dup_frac(self, builder):
        builder.add_num_column("c1", "t", "n", lo=0, hi=10, n=100, dup_frac=0.2)
        lake = builder.build()
        assert len(lake.numeric_values) == 120

    def test_add_doc_records_gt(self, builder):
        builder.add_str_column("c1", "t", "c", topic="fruit",
                               values=builder.pool("fruit", 0, 30))
        builder.add_doc("c1", "d1", "title", cite=[("t.c", 3)],
                        ctx=[("fruit", 2)], semantic_links=["t.c"])
        lake = builder.build()
        kinds = set(lake.gt_doc2col["kind"])
        assert kinds == {"value", "semantic"}

    def test_doc_contains_cited_values(self, builder):
        builder.add_str_column("c1", "t", "c", topic="fruit",
                               values=builder.pool("fruit", 0, 30))
        builder.add_doc("c1", "d1", "title", cite=[("t.c", 3)], noise=0, chatter=0)
        lake = builder.build()
        words = set(lake.docs.iloc[0]["text"].split())
        cited = words & set(lake.string_values["value"])
        assert len(cited) == 3

    def test_union_variants_grouped(self, builder):
        builder.add_str_column("c1", "base", "c", topic="fruit",
                               values=builder.pool("fruit", 0, 40))
        tables = builder.add_union_variants("c1", "base", 2, group="g")
        lake = builder.build()
        assert len(tables) == 3
        assert set(lake.union_groups["table"]) == set(tables)

    def test_union_variant_value_subset(self, builder):
        builder.add_str_column("c1", "base", "c", topic="fruit",
                               values=builder.pool("fruit", 0, 40))
        builder.add_union_variants("c1", "base", 1, group="g", row_frac=0.5)
        lake = builder.build()
        base_vals = set(lake.string_values.loc[
            lake.string_values["col_id"] == "base.c", "value"])
        var_col = [c for c in lake.columns["col_id"] if c.startswith("base_v1.")][0]
        var_vals = set(lake.string_values.loc[
            lake.string_values["col_id"] == var_col, "value"])
        assert var_vals <= base_vals
        assert 0 < len(var_vals) < len(base_vals)

    def test_union_variant_value_noise(self, builder):
        builder.add_str_column("c1", "base", "c", topic="fruit",
                               values=builder.pool("fruit", 0, 25))
        builder.add_union_variants("c1", "base", 1, group="g", row_frac=0.8,
                                   value_noise_frac=0.5)
        lake = builder.build()
        base_vals = set(lake.string_values.loc[
            lake.string_values["col_id"] == "base.c", "value"])
        var_col = [c for c in lake.columns["col_id"] if c.startswith("base_v1.")][0]
        var_vals = set(lake.string_values.loc[
            lake.string_values["col_id"] == var_col, "value"])
        assert not (var_vals <= base_vals)  # noise escaped the base column

    def test_exact_containment_pandas(self, builder):
        builder.add_str_column("c1", "t1", "a", topic="fruit",
                               values=builder.pool("fruit", 0, 40))
        builder.add_str_column("c1", "t2", "b", topic="fruit",
                               values=builder.pool("fruit", 0, 20))
        lake = builder.build()
        cont = lake.exact_containment()
        row = cont.iloc[0]
        assert row["inter"] == 20
        # direction: cont of the smaller (b) inside the larger (a) is 1.0
        cb = row["cont_b"] if row["col_b"] == "t2.b" else row["cont_a"]
        assert cb == 1.0


class TestRecipes:
    @pytest.mark.parametrize("name", ALL_LAKES)
    def test_builds_deterministically(self, name):
        a, b = build_lake(name), build_lake(name)
        pd.testing.assert_frame_equal(a.columns, b.columns)
        pd.testing.assert_frame_equal(a.string_values, b.string_values)
        pd.testing.assert_frame_equal(a.docs, b.docs)

    @pytest.mark.parametrize("name", ALL_LAKES)
    def test_col_ids_unique(self, lakes, name):
        assert lakes[name].columns["col_id"].is_unique

    @pytest.mark.parametrize("name", ALL_LAKES)
    def test_values_reference_known_columns(self, lakes, name):
        lake = lakes[name]
        known = set(lake.columns["col_id"])
        assert set(lake.string_values["col_id"]) <= known
        assert set(lake.numeric_values["col_id"]) <= known

    @pytest.mark.parametrize("name", ALL_LAKES)
    def test_doc_gt_references_known(self, lakes, name):
        lake = lakes[name]
        assert set(lake.gt_doc2col["col_id"]) <= set(lake.columns["col_id"])
        assert set(lake.gt_doc2col["doc_id"]) <= set(lake.docs["doc_id"])

    def test_pharma_pkfk_containment_by_construction(self, pharma):
        """Most schema FK links have high exact value containment."""
        dv = pharma.distinct_values()
        by_col = {c: set(g["value"]) for c, g in dv.groupby("col_id")}
        str_links = [
            (f, p) for f, p in
            pharma.gt_pkfk[["fk_col_id", "pk_col_id"]].itertuples(index=False)
            if f in by_col and p in by_col
        ]
        conts = [len(by_col[f] & by_col[p]) / len(by_col[f])
                 for f, p in str_links]
        assert np.mean([c >= 0.8 for c in conts]) > 0.6  # some dirty by design

    def test_pharma_has_dirty_fk(self, pharma):
        dv = pharma.distinct_values()
        by_col = {c: set(g["value"]) for c, g in dv.groupby("col_id")}
        f = by_col["adverse_events.drug_id"]
        p = by_col["drugs.drug_id"]
        assert 0.4 < len(f & p) / len(f) < 0.8

    def test_gt_doc2table_derivation(self, pharma):
        d2t = pharma.gt_doc2table()
        assert set(d2t.columns) == {"doc_id", "table"}
        assert len(d2t) <= len(pharma.gt_doc2col)

    def test_collections_flags(self, pharma):
        c = pharma.collections.set_index("collection")
        assert bool(c.loc["pubmed", "is_text"])
        assert not bool(c.loc["drugbank", "is_text"])

    def test_mlopen_ls_skew(self, mlopen):
        """LS must contain the heavy cardinality skew that drives 2C-LS."""
        sizes = mlopen.distinct_values().groupby("col_id").size()
        assert sizes["users_l.user_id"] > 2000
        assert sizes["sessions_l.user_ref"] < 100


class TestExactContainmentSpark:
    def test_matches_pandas_and_oracle(self, spark, pharma):
        sub = pharma.string_values[
            pharma.string_values["col_id"].str.startswith(("drugs.", "trials.",
                                                           "dosages."))]
        sdf = spark.createDataFrame(sub)
        got = exact_containment_spark(sdf)
        assert_equivalent(
            got.select("col_a", "col_b", "inter", "n_a", "n_b"),
            """WITH dv AS (SELECT DISTINCT col_id, value FROM vals),
                    sz AS (SELECT col_id, count(*) AS n FROM dv GROUP BY col_id)
               SELECT a.col_id AS col_a, b.col_id AS col_b,
                      count(*) AS inter, any_value(sa.n) AS n_a,
                      any_value(sb.n) AS n_b
               FROM dv a JOIN dv b ON a.value = b.value AND a.col_id < b.col_id
               JOIN sz sa ON sa.col_id = a.col_id
               JOIN sz sb ON sb.col_id = b.col_id
               GROUP BY a.col_id, b.col_id""",
            vals=sub,
        )

    def test_matches_generator_pandas(self, spark, pharma):
        cols = ["drugs.drug_id", "trials.drug_id", "dosages.drug_id"]
        sub = pharma.string_values[pharma.string_values["col_id"].isin(cols)]
        spark_out = exact_containment_spark(
            spark.createDataFrame(sub)).toPandas()
        pandas_out = pharma.exact_containment(cols)
        key = ["col_a", "col_b"]
        merged = spark_out.merge(pandas_out, on=key, suffixes=("_s", "_p"))
        assert len(merged) == len(pandas_out)
        assert (merged["inter_s"] == merged["inter_p"]).all()
