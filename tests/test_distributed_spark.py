"""Spark fan-out of forest sampling and solver tasks.

Verifies the RDD path produces exactly the statistics the local path
produces (same seeds), is deterministic, and that full algorithm runs
work through Spark.
"""
import numpy as np
import pytest

from repro.core.approx import approx_greedy
from repro.core.forest_cfcm import forest_cfcm
from repro.core.params import Params
from repro.core.schur_cfcm import schur_cfcm
from repro.forest.distributed import SampleConfig, adaptive_forest_stats


def _cfg(use_spark: bool) -> SampleConfig:
    return SampleConfig(batch0=128, r_coeff=4, max_rounds=2, use_spark=use_spark)


class TestSparkSampling:
    def test_matches_local_exactly(self, spark, karate):
        # Same seeds → identical per-forest contributions, any partitioning.
        loc, _ = adaptive_forest_stats(None, karate, [33], None, 0.3, seed=11, config=_cfg(False))
        dist, _ = adaptive_forest_stats(spark, karate, [33], None, 0.3, seed=11, config=_cfg(True))
        assert loc.n_forests == dist.n_forests
        np.testing.assert_allclose(loc.z_sum, dist.z_sum, atol=1e-9)
        np.testing.assert_allclose(loc.z_sq, dist.z_sq, atol=1e-9)

    def test_matches_local_with_weights(self, spark, karate):
        rng = np.random.default_rng(0)
        W = rng.choice([-1.0, 1.0], size=(4, karate.n))
        W[:, 33] = 0.0
        loc, _ = adaptive_forest_stats(None, karate, [33], W, 0.3, seed=5, config=_cfg(False))
        dist, _ = adaptive_forest_stats(spark, karate, [33], W, 0.3, seed=5, config=_cfg(True))
        np.testing.assert_allclose(loc.y_sum, dist.y_sum, atol=1e-9)

    def test_matches_local_with_root_counts(self, spark, karate):
        roots = [5, 33, 0]
        loc, _ = adaptive_forest_stats(
            None, karate, roots, None, 0.3, t_nodes=[0, 33], seed=6, config=_cfg(False)
        )
        dist, _ = adaptive_forest_stats(
            spark, karate, roots, None, 0.3, t_nodes=[0, 33], seed=6, config=_cfg(True)
        )
        np.testing.assert_allclose(loc.root_counts, dist.root_counts, atol=1e-9)

    def test_deterministic_across_runs(self, spark, karate):
        a, _ = adaptive_forest_stats(spark, karate, [33], None, 0.3, seed=3, config=_cfg(True))
        b, _ = adaptive_forest_stats(spark, karate, [33], None, 0.3, seed=3, config=_cfg(True))
        np.testing.assert_array_equal(a.z_sum, b.z_sum)


@pytest.fixture()
def spark_params() -> Params:
    return Params(eps=0.3, sample=SampleConfig(batch0=128, r_coeff=4, max_rounds=2, use_spark=True))


class TestAlgorithmsOnSpark:
    def test_forest_cfcm(self, spark, ba200, spark_params):
        res = forest_cfcm(spark, ba200, 3, spark_params)
        assert len(set(res.S)) == 3

    def test_schur_cfcm(self, spark, ba200, spark_params):
        res = schur_cfcm(spark, ba200, 3, spark_params)
        assert len(set(res.S)) == 3

    def test_approx_greedy(self, spark, ba200, spark_params):
        res = approx_greedy(spark, ba200, 3, spark_params)
        assert len(set(res.S)) == 3

    def test_forest_spark_equals_local(self, spark, karate, spark_params):
        local_params = Params(
            eps=0.3, sample=SampleConfig(batch0=128, r_coeff=4, max_rounds=2, use_spark=False)
        )
        a = forest_cfcm(spark, karate, 3, spark_params)
        b = forest_cfcm(None, karate, 3, local_params)
        assert a.S == b.S  # identical seeds → identical selections

    def test_approx_spark_equals_local(self, spark, karate):
        p = Params(eps=0.3)
        a = approx_greedy(spark, karate, 3, p)
        b = approx_greedy(None, karate, 3, p)
        assert a.S == b.S
