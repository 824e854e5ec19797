"""Unit tests for the count-min sketch substrate."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.sketch.cms import CountMinSketch


class TestCountMinSketch:
    def test_never_underestimates(self):
        cms = CountMinSketch(128, 4)
        g = np.random.default_rng(0)
        xs = g.integers(0, 1000, 5000).astype(np.int64)
        cms.add(xs)
        true = np.bincount(xs, minlength=1000)
        uniq = np.unique(xs)
        assert (cms.estimate(uniq) >= true[uniq]).all()

    def test_exact_when_wide(self):
        cms = CountMinSketch(1 << 16, 4)
        xs = np.arange(100, dtype=np.int64)
        cms.add(xs, 3)
        assert (cms.estimate(xs) == 3).all()

    def test_weighted_add(self):
        cms = CountMinSketch(1 << 12, 4)
        xs = np.array([1, 2, 3], dtype=np.int64)
        cms.add(xs, np.array([5, 7, 9]))
        assert (cms.estimate(xs) >= np.array([5, 7, 9])).all()
        assert cms.total == 21

    def test_epsilon_delta_guarantee(self):
        # Overestimate <= eps * total for the vast majority of keys.
        eps, delta = 0.01, 0.01
        cms = CountMinSketch.from_error(eps, delta)
        g = np.random.default_rng(1)
        xs = g.integers(0, 5000, 50_000).astype(np.int64)
        cms.add(xs)
        uniq = np.unique(xs)
        true = np.bincount(xs)[uniq]
        err = cms.estimate(uniq) - true
        assert (err >= 0).all()
        assert (err <= eps * cms.total).mean() > 1 - 5 * delta

    def test_from_error_geometry(self):
        cms = CountMinSketch.from_error(0.01, 0.05)
        assert cms.width == int(np.ceil(np.e / 0.01))
        assert cms.depth == 3

    @pytest.mark.parametrize("eps,delta", [(0, 0.1), (1.5, 0.1), (0.1, 0), (0.1, 1)])
    def test_from_error_bad_params(self, eps, delta):
        with pytest.raises(ValueError):
            CountMinSketch.from_error(eps, delta)

    def test_merge_matches_combined(self):
        a, b = CountMinSketch(256, 3, seed=7), CountMinSketch(256, 3, seed=7)
        xa = np.arange(50, dtype=np.int64)
        xb = np.arange(25, 75, dtype=np.int64)
        a.add(xa)
        b.add(xb)
        direct = CountMinSketch(256, 3, seed=7)
        direct.add(np.concatenate([xa, xb]))
        assert np.array_equal(a.merge(b).table, direct.table)

    def test_merge_incompatible_raises(self):
        with pytest.raises(ValueError, match="incompatible"):
            CountMinSketch(256, 3).merge(CountMinSketch(128, 3))
        with pytest.raises(ValueError, match="incompatible"):
            CountMinSketch(256, 3, seed=1).merge(CountMinSketch(256, 3, seed=2))

    def test_total_row_invariant(self):
        cms = CountMinSketch(64, 5)
        cms.add(np.arange(1000, dtype=np.int64))
        assert (cms.table.sum(axis=1) == 1000).all()

    @pytest.mark.parametrize("w,d", [(0, 3), (10, 0), (-1, 2)])
    def test_bad_geometry(self, w, d):
        with pytest.raises(ValueError):
            CountMinSketch(w, d)

    def test_absent_key_estimate_small(self):
        cms = CountMinSketch(1 << 14, 4)
        cms.add(np.arange(100, dtype=np.int64))
        assert cms.estimate(np.int64(10**9))[0] <= 1

    @settings(max_examples=30, deadline=None)
    @given(st.lists(st.integers(min_value=-(2**62), max_value=2**62), min_size=1, max_size=100))
    def test_never_underestimates_hypothesis(self, xs):
        cms = CountMinSketch(64, 3)
        arr = np.array(xs, dtype=np.int64)
        cms.add(arr)
        uniq, counts = np.unique(arr, return_counts=True)
        assert (cms.estimate(uniq) >= counts).all()


class TestDistributedCms:
    def test_matches_driver_sketch(self, spark, kmers):
        """Per-partition sketches summed on the driver == one-shot sketch."""
        from repro.sketch.cms import cms_from_kmers

        dist = cms_from_kmers(kmers, 4096, 3, seed=2)
        pdf = kmers.toPandas()
        direct = CountMinSketch(4096, 3, seed=2)
        direct.add(pdf["code"].to_numpy(np.int64))
        assert np.array_equal(dist.table, direct.table)
        assert dist.total == len(pdf)

    def test_multiplicity_estimate_tracks_exact(self, spark, kmers):
        """The CMS estimate never undercounts any sampled k-mer and its
        mean stays close to the exact per-sample mean (multiplicity is
        heavy-tailed, so the comparison must use the same sample)."""
        import numpy as np

        from repro.genomes.generator import cms_multiplicity_estimate
        from repro.sketch.cms import cms_from_kmers

        cms = cms_from_kmers(kmers, 1 << 16, 4, seed=0)
        pdf = kmers.toPandas()
        counts = pdf.groupby("code").size()
        codes = counts.index.to_numpy(np.int64)
        g = np.random.default_rng(0)
        probe = g.choice(codes, size=1500, replace=False)
        true = counts.loc[probe].to_numpy(np.int64)
        est = cms.estimate(probe)
        assert (est >= true).all()
        assert est.mean() < true.mean() * 1.3
        # The convenience wrapper agrees with the same seed/sample.
        assert cms_multiplicity_estimate(
            kmers, width=1 << 16, depth=4, sample=1500, seed=0
        ) == pytest.approx(est.mean())
