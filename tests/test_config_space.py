"""Unit tests for the 30-parameter Spark configuration space and the
Sobol' low-discrepancy sampler."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.config_space import (
    SPARK_PARAMS, ConfigSpace, Param, hibench_space, sobol,
)


@pytest.fixture(scope="module")
def space():
    return ConfigSpace()


class TestParams:
    def test_thirty_parameters(self, space):
        assert space.dim == 30  # paper §2.1: 30 performance-critical params

    def test_names_unique(self, space):
        assert len(set(space.names)) == 30

    def test_defaults_within_ranges(self):
        for p in SPARK_PARAMS:
            if p.kind == "cat":
                assert p.default in p.choices
            else:
                assert p.low <= p.default <= p.high

    def test_key_params_present(self, space):
        for name in (
            "spark.executor.instances", "spark.executor.cores",
            "spark.executor.memory", "spark.memory.fraction",
            "spark.memory.storageFraction", "spark.default.parallelism",
            "spark.sql.shuffle.partitions", "spark.io.compression.codec",
            "spark.serializer",
        ):
            assert name in space.names

    def test_param_unit_roundtrip_int(self):
        p = Param("x", "int", 1, 800, log=True, default=8)
        for v in (1, 8, 100, 800):
            assert p.from_unit(p.to_unit(v)) == v

    def test_param_unit_roundtrip_cat(self):
        p = Param("c", "cat", choices=("a", "b", "c"), default="a")
        for v in p.choices:
            assert p.from_unit(p.to_unit(v)) == v

    def test_param_unit_clamps(self):
        p = Param("x", "float", 0.4, 0.9)
        assert p.from_unit(-3.0) == pytest.approx(0.4)
        assert p.from_unit(7.0) == pytest.approx(0.9)


class TestSpace:
    def test_unit_roundtrip_default(self, space):
        d = space.default_config()
        assert space.from_unit(space.to_unit(d)) == space.clip(d)

    def test_unit_vector_in_cube(self, space):
        rng = np.random.default_rng(0)
        for c in space.sample_random(20, rng):
            u = space.to_unit(c)
            assert np.all(u >= -1e-9) and np.all(u <= 1 + 1e-9)

    def test_cat_mask(self, space):
        mask = space.cat_mask
        assert mask.sum() == sum(1 for p in space.params if p.kind == "cat")
        assert mask[space.index_of("spark.serializer")]
        assert not mask[space.index_of("spark.executor.instances")]

    def test_sample_random_respects_subspace(self, space):
        rng = np.random.default_rng(0)
        base = space.default_config()
        dims = [0, 2]
        for c in space.sample_random(10, rng, subspace=dims, base=base):
            for i, p in enumerate(space.params):
                if i not in dims:
                    assert c[p.name] == base[p.name]

    def test_sample_random_varies_subspace(self, space):
        rng = np.random.default_rng(0)
        vals = {
            c["spark.executor.instances"]
            for c in space.sample_random(20, rng, subspace=[0])
        }
        assert len(vals) > 3

    def test_clip_snaps_to_grid(self, space):
        cfg = space.default_config() | {"spark.executor.instances": 12345}
        assert space.clip(cfg)["spark.executor.instances"] == 800

    def test_index_of(self, space):
        assert space.names[space.index_of("spark.serializer")] == "spark.serializer"

    def test_hibench_space_smaller(self):
        hb = hibench_space()
        assert hb.dim == 30
        p = hb.params[hb.index_of("spark.executor.instances")]
        assert p.high == 96

    def test_sample_sobol_configs_valid(self, space):
        for c in space.sample_sobol(8, seed=1):
            u = space.to_unit(c)
            assert np.all((u >= 0) & (u <= 1))

    def test_sample_sobol_subspace_pins_rest(self, space):
        base = space.default_config()
        dims = [1, 3]
        for c in space.sample_sobol(6, seed=0, subspace=dims, base=base):
            for i, p in enumerate(space.params):
                if i not in dims:
                    assert c[p.name] == base[p.name]


class TestSobol:
    def test_shape_and_range(self):
        pts = sobol(64, 31)
        assert pts.shape == (64, 31)
        assert pts.min() >= 0.0 and pts.max() < 1.0

    def test_deterministic(self):
        assert np.array_equal(sobol(16, 5, seed=2), sobol(16, 5, seed=2))

    def test_seed_shifts(self):
        assert not np.array_equal(sobol(16, 5, seed=1), sobol(16, 5, seed=2))

    def test_no_duplicate_points(self):
        pts = sobol(128, 8)
        assert len(np.unique(pts, axis=0)) == 128

    def test_stratification_beats_iid_worst_case(self):
        # first dimension of a digitally-shifted Sobol' fills [0,1)
        # evenly: each of 8 bins gets exactly 16 of 128 points
        pts = sobol(128, 3, seed=0)
        counts, _ = np.histogram(pts[:, 0], bins=8, range=(0, 1))
        assert np.all(counts == 16)

    @settings(max_examples=10, deadline=None)
    @given(st.integers(min_value=1, max_value=40), st.integers(min_value=0, max_value=5))
    def test_any_dim_in_unit_cube(self, d, seed):
        pts = sobol(32, d, seed=seed)
        assert pts.shape == (32, d)
        assert pts.min() >= 0.0 and pts.max() < 1.0
