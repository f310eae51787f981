"""Tests for the periodic source-rate pattern (§V-A)."""
from collections import Counter

from repro.sim.source_rates import BASE_CYCLE, periodic_pattern, pretrain_rates


class TestPattern:
    def test_paper_cycle(self):
        assert BASE_CYCLE == (3, 7, 4, 2, 1, 10, 8, 5, 6, 9)

    def test_length_120(self):
        assert len(periodic_pattern()) == 120  # 20 × 6

    def test_each_multiplier_appears_12_times(self):
        counts = Counter(periodic_pattern())
        assert set(counts) == set(range(1, 11))
        assert all(v == 12 for v in counts.values())

    def test_permutations_differ(self):
        seq = periodic_pattern()
        blocks = [tuple(seq[i : i + 20]) for i in range(0, 120, 20)]
        assert len(set(blocks)) > 1

    def test_deterministic(self):
        assert periodic_pattern(seed=7) == periodic_pattern(seed=7)
        assert periodic_pattern(seed=7) != periodic_pattern(seed=8)


class TestPretrainRates:
    def test_range_and_disjointness(self):
        rates = pretrain_rates(200, seed=1)
        assert len(rates) == 200
        assert all(1.0 < r < 10.0 for r in rates)
        # disjoint from the integer tuning multipliers
        assert all(abs(r - round(r)) > 0.05 for r in rates)

    def test_deterministic(self):
        assert pretrain_rates(10, seed=3) == pretrain_rates(10, seed=3)
