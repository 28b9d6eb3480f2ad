"""Tests for distributed connected components (repro.cc.components)."""
import pandas as pd
import pytest

from repro.cc.components import connected_components
from repro.cc.reference import component_labels
from repro.webgraph.generator import web_graph


def _labels_of(df):
    return {int(r["id"]): int(r["comp"]) for r in df.collect()}


class TestConnectedComponents:
    def test_two_components(self, spark):
        pdf = pd.DataFrame({"src": [1, 2, 5], "dst": [2, 3, 6]})
        out = _labels_of(connected_components(spark.createDataFrame(pdf)))
        assert out == {1: 1, 2: 1, 3: 1, 5: 5, 6: 5}

    def test_matches_union_find_random(self, spark):
        pdf = web_graph(n=400, avg_degree=3, seed=3)
        out = _labels_of(connected_components(spark.createDataFrame(pdf)))
        ref = component_labels([tuple(r) for r in pdf.to_numpy()], set())
        assert out == ref

    def test_long_path_converges(self, spark):
        # Path of 80 vertices: stresses pointer jumping depth.
        pdf = pd.DataFrame({"src": range(80), "dst": range(1, 81)})
        out = _labels_of(connected_components(spark.createDataFrame(pdf)))
        assert set(out.values()) == {0} and len(out) == 81

    def test_weight_threshold_pushdown(self, spark):
        pdf = pd.DataFrame(
            {"src": [1, 2, 3], "dst": [2, 3, 4], "w_int": [10, 1, 10]}
        )
        out = _labels_of(
            connected_components(
                spark.createDataFrame(pdf), weight_col="w_int", threshold=5
            )
        )
        assert out == {1: 1, 2: 1, 3: 3, 4: 3}

    def test_extra_vertices_are_singletons(self, spark):
        pdf = pd.DataFrame({"src": [1], "dst": [2]})
        verts = spark.createDataFrame(pd.DataFrame({"id": [1, 2, 9]}))
        out = _labels_of(
            connected_components(spark.createDataFrame(pdf), vertices=verts)
        )
        assert out == {1: 1, 2: 1, 9: 9}

    def test_comp_is_min_id(self, spark):
        pdf = pd.DataFrame({"src": [10, 7], "dst": [7, 3]})
        out = _labels_of(connected_components(spark.createDataFrame(pdf)))
        assert set(out.values()) == {3}
