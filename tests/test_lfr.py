"""Tests for the LFR-lite benchmark generator (repro.lfr.generator)."""
import numpy as np
import pandas as pd
import pytest

from repro.lfr.generator import lfr_graph


@pytest.fixture(scope="module")
def default_instance():
    return lfr_graph(
        n=600, k=15, maxk=40, mu=0.1, on=60, om=2, min_c=20, max_c=80, seed=7
    )


class TestLfrStructure:
    def test_canonical_edges(self, default_instance):
        e = default_instance.edges
        assert (e["src"] < e["dst"]).all()
        assert not e.duplicated().any()

    def test_vertex_range(self, default_instance):
        e = default_instance.edges
        ids = np.unique(np.concatenate([e["src"], e["dst"]]))
        assert ids.min() >= 0 and ids.max() < 600

    def test_every_vertex_has_membership(self, default_instance):
        assert set(default_instance.memberships) == set(range(600))
        assert all(len(s) >= 1 for s in default_instance.memberships.values())

    def test_overlap_counts(self, default_instance):
        n_over = sum(
            1 for s in default_instance.memberships.values() if len(s) >= 2
        )
        # `on` vertices were asked to hold om=2 memberships.
        assert n_over == 60

    def test_om_respected(self):
        res = lfr_graph(n=400, k=12, maxk=30, mu=0.1, on=40, om=3, seed=3)
        over = [s for s in res.memberships.values() if len(s) >= 2]
        assert len(over) == 40
        assert max(len(s) for s in over) == 3

    def test_community_sizes_within_bounds(self, default_instance):
        # Allow mild overflow from the capacity-exhaustion fallback.
        sizes = [len(c) for c in default_instance.communities]
        assert min(sizes) >= 2
        assert max(sizes) <= 80 * 2

    def test_ground_truth_covers_graph(self, default_instance):
        covered = set().union(*default_instance.communities)
        assert len(covered) == 600


class TestLfrStatistics:
    def test_avg_degree_close(self, default_instance):
        assert default_instance.avg_degree() == pytest.approx(15, rel=0.25)

    def test_realized_mu_close(self, default_instance):
        mu = default_instance.realized_mu()
        assert mu == pytest.approx(0.1, abs=0.07)

    def test_mu_parameter_moves_realized_mu(self):
        lo = lfr_graph(n=400, k=12, maxk=30, mu=0.05, on=40, om=2, seed=5)
        hi = lfr_graph(n=400, k=12, maxk=30, mu=0.3, on=40, om=2, seed=5)
        assert lo.realized_mu() < hi.realized_mu()

    def test_max_degree_bound(self, default_instance):
        e = default_instance.edges
        _, counts = np.unique(
            np.concatenate([e["src"], e["dst"]]), return_counts=True
        )
        # Dedup of the configuration model can only reduce degrees.
        assert counts.max() <= 40

    def test_deterministic_in_seed(self):
        a = lfr_graph(n=300, k=10, maxk=25, mu=0.1, on=30, om=2, seed=11)
        b = lfr_graph(n=300, k=10, maxk=25, mu=0.1, on=30, om=2, seed=11)
        pd.testing.assert_frame_equal(a.edges, b.edges)
        assert a.communities == b.communities

    def test_seed_changes_instance(self):
        a = lfr_graph(n=300, k=10, maxk=25, mu=0.1, on=30, om=2, seed=11)
        b = lfr_graph(n=300, k=10, maxk=25, mu=0.1, on=30, om=2, seed=12)
        assert not a.edges.equals(b.edges)

    def test_params_recorded(self, default_instance):
        p = default_instance.params
        assert p["n"] == 600 and p["mu"] == 0.1 and p["om"] == 2

    def test_larger_n_scales_edges(self):
        small = lfr_graph(n=300, k=10, maxk=25, mu=0.1, on=30, om=2, seed=2)
        large = lfr_graph(n=900, k=10, maxk=25, mu=0.1, on=90, om=2, seed=2)
        assert len(large.edges) > 2 * len(small.edges)
