"""Tests for the LFK overlapping NMI (repro.metrics.nmi)."""
import numpy as np
import pytest

from repro.metrics.nmi import overlapping_nmi


def _random_cover(rng, n, k):
    return [
        set(rng.choice(n, size=rng.integers(5, 20), replace=False).tolist())
        for _ in range(k)
    ]


class TestOverlappingNmi:
    def test_identical_covers(self):
        c = [{0, 1, 2}, {3, 4, 5}, {5, 6, 7}]
        assert overlapping_nmi(c, c) == pytest.approx(1.0)

    def test_identical_overlapping_covers(self):
        c = [set(range(0, 60)), set(range(50, 110)), set(range(100, 160))]
        assert overlapping_nmi(c, c) == pytest.approx(1.0)

    def test_symmetry(self):
        rng = np.random.default_rng(0)
        x = _random_cover(rng, 200, 6)
        y = _random_cover(rng, 200, 5)
        assert overlapping_nmi(x, y) == pytest.approx(overlapping_nmi(y, x))

    def test_range(self):
        rng = np.random.default_rng(1)
        for s in range(5):
            x = _random_cover(rng, 100, 4)
            y = _random_cover(rng, 100, 4)
            v = overlapping_nmi(x, y)
            assert 0.0 <= v <= 1.0

    def test_permuted_community_order(self):
        x = [{0, 1, 2}, {3, 4, 5}, {6, 7, 8}]
        y = [{6, 7, 8}, {0, 1, 2}, {3, 4, 5}]
        assert overlapping_nmi(x, y) == pytest.approx(1.0)

    def test_unrelated_much_lower_than_related(self):
        # A clean partition vs itself is 1; vs a shifted partition much less.
        x = [set(range(i * 10, (i + 1) * 10)) for i in range(10)]
        y = [set(range(i * 10 + 5, (i + 1) * 10 + 5)) for i in range(9)]
        assert overlapping_nmi(x, y) < 0.6

    def test_partial_match_between_zero_and_one(self):
        x = [set(range(0, 50)), set(range(50, 100))]
        y = [set(range(0, 45)) | {90, 91}, set(range(45, 100)) - {90, 91}]
        v = overlapping_nmi(x, y)
        assert 0.3 < v < 1.0

    def test_empty_covers(self):
        assert overlapping_nmi([], []) == 1.0
        assert overlapping_nmi([{1, 2}], []) == 0.0
        assert overlapping_nmi([], [{1, 2}]) == 0.0

    def test_empty_communities_dropped(self):
        x = [{0, 1, 2}, set()]
        y = [{0, 1, 2}]
        assert overlapping_nmi(x, y) == pytest.approx(1.0)

    def test_finer_partition_degrades(self):
        x = [set(range(0, 40)), set(range(40, 80))]
        split = [set(range(0, 20)), set(range(20, 40)), set(range(40, 80))]
        assert overlapping_nmi(x, split) < overlapping_nmi(x, x)

    def test_noise_monotonicity(self):
        # More label noise -> lower NMI, on average.
        rng = np.random.default_rng(7)
        base = [set(range(i * 25, (i + 1) * 25)) for i in range(8)]

        def noisy(frac):
            out = []
            for c in base:
                c = set(c)
                for v in list(c):
                    if rng.random() < frac:
                        c.discard(v)
                        c.add(int(rng.integers(0, 200)))
                out.append(c)
            return out

        v1 = overlapping_nmi(base, noisy(0.05))
        v2 = overlapping_nmi(base, noisy(0.5))
        assert v1 > v2
