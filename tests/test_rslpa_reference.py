"""Tests for the NumPy rSLPA engine (repro.reference.rslpa_ref)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import rand
from repro.reference.rslpa_ref import (
    build_graph,
    draw_choice_matrices,
    labels_long,
    propagate,
    resolve_label_matrix,
)


def _edges(pairs):
    return pd.DataFrame(pairs, columns=["src", "dst"])


@pytest.fixture(scope="module")
def path_graph():
    return build_graph(_edges([(0, 1), (1, 2), (2, 3), (3, 4)]))


class TestBuildGraph:
    def test_ids_sorted(self, path_graph):
        assert np.array_equal(path_graph.ids, np.arange(5))

    def test_degrees(self, path_graph):
        assert path_graph.degrees.tolist() == [1, 2, 2, 2, 1]

    def test_neighbors_sorted(self):
        g = build_graph(_edges([(5, 1), (5, 9), (5, 3)]))
        i = int(g.index_of(np.array([5]))[0])
        nbrs = g.nbrs_flat[g.offsets[i] : g.offsets[i + 1]]
        assert nbrs.tolist() == [1, 3, 9]

    def test_dedup_and_loops(self):
        g = build_graph(_edges([(1, 2), (2, 1), (1, 1), (1, 2)]))
        assert g.degrees.tolist() == [1, 1]

    def test_neighbor_sets(self, path_graph):
        ns = path_graph.neighbor_sets()
        assert ns[0] == {1} and ns[2] == {1, 3}


class TestDrawChoices:
    def test_shapes(self, path_graph):
        src, pos = draw_choice_matrices(path_graph, 10, seed=1)
        assert src.shape == (5, 10) and pos.shape == (5, 10)

    def test_src_is_neighbor(self, path_graph):
        src, _ = draw_choice_matrices(path_graph, 50, seed=1)
        ns = path_graph.neighbor_sets()
        for i, vid in enumerate(path_graph.ids):
            assert set(src[i].tolist()) <= ns[int(vid)]

    def test_pos_in_range(self, path_graph):
        _, pos = draw_choice_matrices(path_graph, 50, seed=1)
        t = np.arange(1, 51)
        assert np.all(pos >= 0) and np.all(pos < t[None, :])

    def test_deterministic(self, path_graph):
        a = draw_choice_matrices(path_graph, 20, seed=9)
        b = draw_choice_matrices(path_graph, 20, seed=9)
        assert np.array_equal(a[0], b[0]) and np.array_equal(a[1], b[1])

    def test_epoch_changes_draws(self, path_graph):
        a = draw_choice_matrices(path_graph, 20, seed=9, epoch=0)
        b = draw_choice_matrices(path_graph, 20, seed=9, epoch=1)
        assert not np.array_equal(a[0], b[0])

    def test_src_uniform_over_neighbors(self):
        # Theorem: src_i^t uniform over N_i — check empirically on a star.
        g = build_graph(_edges([(0, i) for i in range(1, 6)]))
        row = int(g.index_of(np.array([0]))[0])
        src, _ = draw_choice_matrices(g, 5000, seed=4)
        counts = pd.Series(src[row]).value_counts()
        assert set(counts.index) == {1, 2, 3, 4, 5}
        assert counts.min() > 0.8 * counts.max()


class TestResolve:
    def test_anchor_labels(self, path_graph):
        src, pos = draw_choice_matrices(path_graph, 10, seed=1)
        labels = resolve_label_matrix(path_graph, src, pos)
        assert np.array_equal(labels[:, 0], path_graph.ids)

    def test_recurrence_holds(self, path_graph):
        src, pos = draw_choice_matrices(path_graph, 15, seed=2)
        labels = resolve_label_matrix(path_graph, src, pos)
        for t in range(1, 16):
            rows = path_graph.index_of(src[:, t - 1])
            assert np.array_equal(labels[:, t], labels[rows, pos[:, t - 1]])

    def test_labels_are_vertex_ids(self, path_graph):
        src, pos = draw_choice_matrices(path_graph, 15, seed=2)
        labels = resolve_label_matrix(path_graph, src, pos)
        assert set(np.unique(labels).tolist()) <= set(path_graph.ids.tolist())

    def test_labels_long_shape(self, path_graph):
        g, src, pos, labels = propagate(
            _edges([(0, 1), (1, 2), (2, 3), (3, 4)]), 7, seed=3
        )
        ll = labels_long(g, labels)
        assert len(ll) == 5 * 8
        assert set(ll.columns) == {"id", "t", "label"}

    def test_two_cliques_concentrate(self):
        # Two 5-cliques joined by one edge: after enough iterations most
        # labels within a clique come from that clique (trapping property).
        cl1 = [(i, j) for i in range(5) for j in range(i + 1, 5)]
        cl2 = [(i, j) for i in range(5, 10) for j in range(i + 1, 10)]
        g, src, pos, labels = propagate(
            _edges(cl1 + cl2 + [(4, 5)]), 60, seed=8
        )
        left = labels[:5, 20:]
        frac_left = np.isin(left, np.arange(5)).mean()
        right = labels[5:, 20:]
        frac_right = np.isin(right, np.arange(5, 10)).mean()
        assert frac_left > 0.7 and frac_right > 0.7


class TestDistributionTheorems:
    def test_theorem_3_uniform_over_union(self):
        """P(l_src^pos = l) = freq of l in the union of neighbor prefixes."""
        # Star center 0 with 3 leaves; at t=2 the center picks uniformly
        # from {L_1^(<=1), L_2^(<=1), L_3^(<=1)} = 6 slots.
        edges = _edges([(0, 1), (0, 2), (0, 3)])
        hits = []
        for seed in range(800):
            g, src, pos, labels = propagate(edges, 2, seed=seed)
            row0 = int(g.index_of(np.array([0]))[0])
            hits.append(int(labels[row0, 2]))
        counts = pd.Series(hits).value_counts(normalize=True)
        # Leaves' sequences at t<=1: L_i = (i, 0) for i in {1,2,3} — their
        # iteration-1 label is 0 (only neighbor is the center). Union =
        # {1,2,3,0,0,0}: P(0) = 1/2, P(i) = 1/6.
        assert counts[0] == pytest.approx(0.5, abs=0.06)
        for i in (1, 2, 3):
            assert counts[i] == pytest.approx(1 / 6, abs=0.05)
