"""Canonical edge handling on Spark + DuckDB oracle checks."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graph import edges as ged
from repro.graph import generators as gen
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def fig3(spark):
    return ged.from_pandas(spark, gen.fig3_graph())


class TestNormalize:
    def test_orients_dedups_drops_loops(self, spark):
        raw = spark.createDataFrame(
            pd.DataFrame({"src": [1, 2, 3, 3, 0], "dst": [2, 1, 3, 4, 1]})
        )
        out = ged.normalize_edges(raw).toPandas().sort_values(["src", "dst"])
        assert out.values.tolist() == [[0, 1], [1, 2], [3, 4]]

    def test_idempotent(self, spark, fig3):
        again = ged.normalize_edges(fig3).toPandas().sort_values(["src", "dst"])
        orig = fig3.toPandas().sort_values(["src", "dst"])
        pd.testing.assert_frame_equal(
            again.reset_index(drop=True), orig.reset_index(drop=True)
        )

    def test_counts(self, spark, fig3):
        assert ged.num_edges(fig3) == 6
        assert ged.num_vertices(fig3) == 6
        assert ged.max_vertex_id(fig3) == 5


class TestDegreesOracle:
    def test_degrees_match_duckdb(self, spark, fig3):
        got = ged.degrees(fig3)
        assert_equivalent(
            got,
            """
            SELECT v, count(*) AS deg FROM (
                SELECT src AS v FROM e UNION ALL SELECT dst AS v FROM e
            ) GROUP BY v
            """,
            e=fig3,
        )

    def test_degrees_random_graph(self, spark):
        E = ged.from_pandas(spark, gen.gnp(25, 0.3, seed=9))
        assert_equivalent(
            ged.degrees(E),
            """
            SELECT v, count(*) AS deg FROM (
                SELECT src AS v FROM e UNION ALL SELECT dst AS v FROM e
            ) GROUP BY v
            """,
            e=E,
        )

    def test_vertices(self, spark, fig3):
        vs = sorted(r["v"] for r in ged.vertices(fig3).collect())
        assert vs == [0, 1, 2, 3, 4, 5]
