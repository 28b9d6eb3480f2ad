"""Tests for the reference post-processing (repro.reference.postprocess_ref)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.postprocess import candidate_taus, select_tau1
from repro.reference.incremental_ref import canon_pdf
from repro.reference.postprocess_ref import (
    edge_weights_ref,
    extract_cover,
    label_counts,
    postprocess_ref,
    sweep_entropies,
    tau2_int_ref,
)
from repro.reference.rslpa_ref import build_graph, propagate


def _pdf(pairs):
    return pd.DataFrame(pairs, columns=["src", "dst"])


class TestCandidateTaus:
    def test_all_when_few(self):
        assert candidate_taus([5, 1, 3], 0, 8) == [1, 3, 5]

    def test_filters_below_tau2(self):
        assert candidate_taus([1, 3, 5, 7], 4, 8) == [5, 7]

    def test_thins_to_n(self):
        out = candidate_taus(list(range(100)), 0, 5)
        assert len(out) == 5 and out[0] == 0 and out[-1] == 99

    def test_empty_fallback(self):
        assert candidate_taus([], 7, 4) == [7]

    def test_ascending(self):
        out = candidate_taus([9, 2, 5, 2, 7], 0, 10)
        assert out == sorted(set(out))


class TestSelectTau1:
    def test_argmax(self):
        assert select_tau1([(1, 0.5), (2, 0.9), (3, 0.7)]) == 2

    def test_tie_prefers_smaller_tau(self):
        assert select_tau1([(1, 0.9), (2, 0.9)]) == 1

    def test_single(self):
        assert select_tau1([(4, 0.0)]) == 4


class TestWeights:
    def test_label_counts_sum(self):
        g, src, pos, labels = propagate(_pdf([(0, 1), (1, 2)]), 6, seed=1)
        counts = label_counts(g, labels)
        assert counts.groupby("id")["cnt"].sum().eq(7).all()

    def test_identical_sequences_max_weight(self):
        # Two vertices with identical label histograms: w_int = (T+1)^2.
        g = build_graph(_pdf([(0, 1)]))
        labels = np.array([[0, 0, 0], [0, 0, 0]])
        counts = label_counts(g, labels)
        w = edge_weights_ref(_pdf([(0, 1)]), counts)
        assert int(w["w_int"][0]) == 9

    def test_disjoint_sequences_zero_weight(self):
        g = build_graph(_pdf([(0, 1)]))
        labels = np.array([[0, 0, 0], [1, 1, 1]])
        w = edge_weights_ref(_pdf([(0, 1)]), label_counts(g, labels))
        assert int(w["w_int"][0]) == 0

    def test_match_probability_semantics(self):
        # L_0=(0,1), L_1=(1,1): P(match) = (1/2)*(0) + (1/2)*1 = ... via
        # counts: common label 1 with f0=1, f1=2 -> w_int = 2, /(T+1)^2 = 2/4.
        g = build_graph(_pdf([(0, 1)]))
        labels = np.array([[0, 1], [1, 1]])
        w = edge_weights_ref(_pdf([(0, 1)]), label_counts(g, labels))
        assert int(w["w_int"][0]) == 2

    def test_tau2_min_max(self):
        w = pd.DataFrame(
            {"src": [0, 1, 2], "dst": [1, 2, 3], "w_int": [10, 5, 8]}
        )
        # max incident: v0=10, v1=10, v2=8, v3=8 -> min = 8.
        assert tau2_int_ref(w) == 8


class TestExtraction:
    def _weights(self):
        # Two strong pairs (0-1, 2-3) bridged weakly via vertex 4.
        return pd.DataFrame(
            {
                "src": [0, 2, 1, 3],
                "dst": [1, 3, 4, 4],
                "w_int": [10, 10, 4, 4],
            }
        )

    def test_strong_components(self):
        cover = extract_cover(self._weights(), tau1_int=10, tau2_int=4)
        # 4 attaches weakly to both communities -> overlap.
        assert {0, 1, 4} in cover and {2, 3, 4} in cover

    def test_overlap_via_weak_vertex(self):
        cover = extract_cover(self._weights(), tau1_int=10, tau2_int=4)
        membership = [c for c in cover if 4 in c]
        assert len(membership) == 2

    def test_high_tau2_blocks_weak(self):
        cover = extract_cover(self._weights(), tau1_int=10, tau2_int=5)
        assert {0, 1} in cover and {2, 3} in cover
        assert not any(4 in c for c in cover)

    def test_entropy_sweep_matches_direct(self):
        w = self._weights()
        ents = sweep_entropies(w, [4, 10], n_vertices=5)
        assert [t for t, _ in ents] == [4, 10]
        # At τ=4 everything is one component of 5; at τ=10 two pairs.
        e4 = -1.0 * np.log(1.0)  # 5/5 * log(5/5) = 0
        assert ents[0][1] == pytest.approx(0.0)
        e10 = -2 * (2 / 5) * np.log(2 / 5)
        assert ents[1][1] == pytest.approx(e10)


class TestEndToEnd:
    def test_two_cliques(self):
        cl1 = [(i, j) for i in range(6) for j in range(i + 1, 6)]
        cl2 = [(i, j) for i in range(6, 12) for j in range(i + 1, 12)]
        edges = _pdf(cl1 + cl2 + [(5, 6)])
        g, src, pos, labels = propagate(edges, 80, seed=2)
        cover, t1, t2 = postprocess_ref(edges, g, labels, n_candidates=12)
        assert any(len(c & set(range(6))) >= 5 for c in cover)
        assert any(len(c & set(range(6, 12))) >= 5 for c in cover)
        assert t1 >= t2

    def test_every_vertex_covered_on_cliques(self):
        cl1 = [(i, j) for i in range(6) for j in range(i + 1, 6)]
        cl2 = [(i, j) for i in range(6, 12) for j in range(i + 1, 12)]
        edges = _pdf(cl1 + cl2 + [(5, 6)])
        g, src, pos, labels = propagate(edges, 80, seed=2)
        cover, _, _ = postprocess_ref(edges, g, labels, n_candidates=12)
        covered = set().union(*cover) if cover else set()
        # τ2's "no isolated vertex" principle: all 12 vertices assigned.
        assert covered == set(range(12))
