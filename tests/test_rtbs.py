"""Unit tests for reservoir-based time-biased sampling (repro.core.rtbs)."""
import numpy as np
import pytest

from repro.core.rtbs import TimeBiasedReservoir


class TestTimeBiasedReservoir:
    def test_size_bound(self):
        r = TimeBiasedReservoir(size=10, seed=0)
        r.extend(range(1000))
        assert len(r) == 10
        assert len(r.sample()) == 10

    def test_under_capacity_keeps_everything(self):
        r = TimeBiasedReservoir(size=50, seed=0)
        r.extend(range(20))
        assert sorted(r.sample()) == list(range(20))

    def test_rejects_bad_size(self):
        with pytest.raises(ValueError):
            TimeBiasedReservoir(size=0)

    def test_sample_is_time_ordered(self):
        r = TimeBiasedReservoir(size=25, lam=0.01, seed=1)
        r.extend(range(500))
        s = r.sample()
        assert s == sorted(s)

    def test_recency_bias(self):
        """With lam > 0, the sample skews toward recent stream positions."""
        means = []
        for seed in range(10):
            r = TimeBiasedReservoir(size=40, lam=0.01, seed=seed)
            r.extend(range(2000))
            means.append(np.mean(r.sample()))
        assert np.mean(means) > 1400  # uniform would give ~1000

    def test_keeps_some_memory_of_past(self):
        """R-TBS property: unlike a sliding window, old items survive."""
        old = 0
        for seed in range(10):
            r = TimeBiasedReservoir(size=40, lam=0.002, seed=seed)
            r.extend(range(2000))
            old += sum(1 for x in r.sample() if x < 1000)
        assert old > 0

    def test_lam_zero_is_roughly_uniform(self):
        means = []
        for seed in range(20):
            r = TimeBiasedReservoir(size=40, lam=0.0, seed=seed)
            r.extend(range(2000))
            means.append(np.mean(r.sample()))
        assert 800 < np.mean(means) < 1200

    def test_deterministic_in_seed(self):
        a = TimeBiasedReservoir(size=10, lam=0.01, seed=5)
        b = TimeBiasedReservoir(size=10, lam=0.01, seed=5)
        a.extend(range(300))
        b.extend(range(300))
        assert a.sample() == b.sample()
