"""Tests for the eu-2015-tpd substitute generator (repro.webgraph)."""
import numpy as np
import pandas as pd
import pytest

from repro.webgraph.generator import edit_batch, graph_stats, web_graph


@pytest.fixture(scope="module")
def graph():
    return web_graph(n=3000, avg_degree=12, seed=5)


class TestWebGraph:
    def test_canonical(self, graph):
        assert (graph["src"] < graph["dst"]).all()
        assert not graph.duplicated().any()

    def test_edge_count_near_target(self, graph):
        assert len(graph) == pytest.approx(3000 * 12 / 2, rel=0.02)

    def test_power_law_skew(self, graph):
        s = graph_stats(graph)
        # Heavy tail: max degree far above the average (web-like shape).
        assert s["max_degree"] > 10 * s["avg_degree"]

    def test_stats_fields(self, graph):
        s = graph_stats(graph)
        assert set(s) == {"nodes", "edges", "avg_degree", "max_degree"}
        assert s["edges"] == len(graph)
        assert s["avg_degree"] == pytest.approx(
            2 * s["edges"] / s["nodes"], rel=1e-9
        )

    def test_deterministic(self):
        a = web_graph(n=1000, avg_degree=8, seed=1)
        b = web_graph(n=1000, avg_degree=8, seed=1)
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_graph(self):
        a = web_graph(n=1000, avg_degree=8, seed=1)
        b = web_graph(n=1000, avg_degree=8, seed=2)
        assert not a.equals(b)


class TestEditBatch:
    def test_sizes(self, graph):
        ins, dele = edit_batch(graph, 200, seed=9)
        assert len(ins) == 100 and len(dele) == 100

    def test_deletes_are_existing_edges(self, graph):
        _, dele = edit_batch(graph, 100, seed=9)
        existing = {tuple(r) for r in graph.to_numpy()}
        assert all(tuple(r) in existing for r in dele.to_numpy())

    def test_inserts_are_new_edges(self, graph):
        ins, _ = edit_batch(graph, 100, seed=9)
        existing = {tuple(r) for r in graph.to_numpy()}
        assert all(tuple(r) not in existing for r in ins.to_numpy())

    def test_inserts_canonical_unique(self, graph):
        ins, _ = edit_batch(graph, 300, seed=9)
        assert (ins["src"] < ins["dst"]).all()
        assert not ins.duplicated().any()

    def test_odd_batch_splits(self, graph):
        ins, dele = edit_batch(graph, 101, seed=9)
        assert len(ins) + len(dele) == 101

    def test_deterministic(self, graph):
        a = edit_batch(graph, 50, seed=3)
        b = edit_batch(graph, 50, seed=3)
        pd.testing.assert_frame_equal(a[0], b[0])
        pd.testing.assert_frame_equal(a[1], b[1])
