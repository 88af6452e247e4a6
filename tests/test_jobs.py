"""Table-harness smoke tests at unit scale (shape + internal consistency)."""
import pandas as pd
import pytest

from jobs import convergence as job_conv
from jobs import table1, table3, table4, table5
from jobs.common import graph_names, timed
from repro.graph import generators as gen

SMALL = ["fb-lite", "wnd-lite"]


class TestCommon:
    def test_graph_names_default(self):
        assert graph_names() == list(gen.PAPER_NAMES)

    def test_graph_names_filter(self):
        assert graph_names(["fb-lite"]) == ["fb-lite"]

    def test_graph_names_unknown(self):
        with pytest.raises(ValueError):
            graph_names(["nope"])

    def test_timed(self):
        with timed() as t:
            pass
        assert t["s"] >= 0


class TestTable3:
    def test_columns_and_positivity(self, spark):
        df = table3.run(spark, scale="unit", graphs=SMALL)
        assert list(df.columns) == ["graph", "paper_graph", "V", "E", "triangles", "K4"]
        assert len(df) == 2
        assert (df[["V", "E", "triangles", "K4"]] > 0).all().all()

    def test_counts_match_reference(self, spark):
        from repro.graph import local as gl

        df = table3.run(spark, scale="unit", graphs=["wnd-lite"])
        pdf = gen.load("wnd-lite", "unit")
        assert int(df["triangles"].iloc[0]) == len(gl.k_cliques(pdf, 3))
        assert int(df["K4"].iloc[0]) == len(gl.k_cliques(pdf, 4))


class TestTable4:
    def test_rows_and_bound(self, spark):
        df = table4.run(spark, scale="unit", graphs=["wnd-lite"])
        assert len(df) == 3  # three decompositions
        # Lemma 2: both algorithms within the degree-levels bound;
        # AND never needs more sweeps than SND.
        assert (df["snd_iters"] <= df["degree_levels"]).all()
        assert (df["and_iters"] <= df["snd_iters"]).all()

    def test_matches_pure_local_pipeline(self, spark):
        df = table4.run(spark, scale="unit", graphs=["fb-lite"])
        from repro.core import seq

        pdf = gen.load("fb-lite", "unit")
        nuc, _ = seq.Nucleus.from_edges(pdf, 1, 2)
        row = df[df["decomposition"] == "k-core"].iloc[0]
        assert row["snd_iters"] == seq.snd_seq(nuc)[1]
        assert row["degree_levels"] == seq.degree_levels(nuc)


class TestTable5:
    def test_shape_and_metrics(self, spark):
        df = table5.run(spark, scale="unit", graphs=["wnd-lite"],
                        decomps=[("k-core", 1, 2), ("k-truss", 2, 3)])
        assert list(df["decomposition"]) == ["k-core", "k-truss"]
        assert (df["peel_s"] > 0).all() and (df["local_s"] > 0).all()
        # speedup can round toward 0 at toy scale; just require finity
        assert (df["speedup"] >= 0).all()
        assert (df["n_r"] > 0).all()
        # the dataflow cost model: local iterations beat global rounds
        assert (df["peel_rounds"] >= 1).all()
        assert (df["local_iters"] >= 0).all()


class TestTable1:
    def test_is_34_subset(self, spark):
        df = table1.run(spark, scale="unit")
        assert list(df["graph"]) == table1.GRAPHS
        assert set(df["decomposition"]) == {"(3,4)"}


class TestConvergenceJob:
    def test_quality_columns(self, spark):
        df = job_conv.run(spark, scale="unit", graphs=["fb-lite"])
        assert len(df) == 3
        # Kendall-Tau reaches 1.0 by construction at convergence; iter
        # milestones must be within the total iteration count.
        assert (df["iters_to_90pct"] <= df["iters_total"]).all()
        assert (df["iters_to_99pct"] <= df["iters_total"]).all()
        assert (df["iters_to_90pct"] <= df["iters_to_99pct"]).all()
        assert df["kt_iter5"].between(-1, 1).all()
