"""Numeric statistics substrate tests, DuckDB-oracle-checked."""
import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent
from repro.sketch.stats import (NumericStats, numeric_similarity,
                                numeric_stats_spark, range_overlap)


class TestRangeOverlap:
    @pytest.mark.parametrize("a,b,expected", [
        ((0, 10), (0, 10), 1.0),          # identical
        ((0, 10), (2, 8), 1.0),           # containment of the smaller
        ((0, 10), (5, 15), 0.5),          # half overlap of equal spans
        ((0, 10), (20, 30), 0.0),         # disjoint
        ((0, 10), (10, 20), 0.0),         # touching endpoints
        ((5, 5), (0, 10), 1.0),           # point inside
        ((5, 5), (6, 10), 0.0),           # point outside
        ((0, 4), (2, 10), 0.5),           # partial, smaller span a
    ])
    def test_cases(self, a, b, expected):
        assert range_overlap(*a, *b) == pytest.approx(expected)

    def test_symmetric(self):
        assert range_overlap(0, 10, 5, 25) == range_overlap(5, 25, 0, 10)


class TestNumericSimilarity:
    def test_with_dataclass(self):
        a = NumericStats("a", 10, 10, 0.0, 10.0, 5.0)
        b = NumericStats("b", 10, 10, 2.0, 8.0, 5.0)
        assert numeric_similarity(a, b) == 1.0

    def test_span_property(self):
        assert NumericStats("a", 1, 1, 2.0, 7.0, 4.0).span == 5.0


class TestNumericStatsSpark:
    @pytest.fixture(scope="class")
    def values(self):
        rng = np.random.default_rng(0)
        return pd.DataFrame({
            "de_id": ["c1"] * 100 + ["c2"] * 50,
            "value": np.concatenate([
                rng.integers(0, 1000, 100).astype(float),
                rng.random(50) * 10,
            ]),
        })

    def test_oracle_equivalence(self, spark, values):
        sdf = spark.createDataFrame(values)
        stats = numeric_stats_spark(sdf, id_col="de_id")
        out = spark.createDataFrame(stats[["col_id", "n", "n_distinct",
                                           "vmin", "vmax", "mean"]])
        assert_equivalent(
            out,
            """SELECT de_id AS col_id, count(value) AS n,
                      count(DISTINCT value) AS n_distinct,
                      min(value) AS vmin, max(value) AS vmax,
                      avg(value) AS mean
               FROM vals GROUP BY de_id""",
            vals=values,
        )

    def test_frac_int(self, spark, values):
        stats = numeric_stats_spark(spark.createDataFrame(values),
                                    id_col="de_id").set_index("col_id")
        assert stats.loc["c1", "frac_int"] == 1.0
        assert stats.loc["c2", "frac_int"] < 0.1
