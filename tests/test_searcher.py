"""HarmonySearcher build path: modes, plans, config validation."""
import numpy as np
import pytest

from repro.core.searcher import MODES, HarmonyConfig, HarmonySearcher
from tests.conftest import TEST_K, TEST_NPROBE


def test_invalid_mode_rejected():
    with pytest.raises(ValueError, match="mode"):
        HarmonyConfig(mode="hybrid-ish")


def test_modes_constant():
    assert MODES == ("harmony", "vector", "dimension")


def test_vector_mode_grid(built):
    plan = built["vector"].di.plan
    assert (plan.b_vec, plan.b_dim) == (4, 1)
    assert plan.mode == "vector"


def test_dimension_mode_grid(built):
    plan = built["dimension"].di.plan
    assert (plan.b_vec, plan.b_dim) == (1, 4)
    assert plan.mode == "dimension"


def test_harmony_mode_chose_cost_optimal_grid(built):
    s = built["harmony"]
    assert s.planned_cost is not None
    assert s.di.plan.b_vec * s.di.plan.b_dim == 4


def test_fixed_modes_have_no_planned_cost(built):
    assert built["vector"].planned_cost is None
    assert built["dimension"].planned_cost is None


def test_with_engine_shares_index(built):
    s = built["harmony"]
    s2 = s.with_engine(use_pruning=False)
    assert s2.dindex is s.dindex
    assert s2.engine.use_pruning is False
    assert s.engine.use_pruning is True


def test_with_engine_overrides_schedule_and_waves(built):
    s2 = built["dimension"].with_engine(schedule="static", n_waves=1)
    assert s2.engine.schedule == "static"
    assert s2.engine.n_waves == 1


def test_di_alias(built):
    s = built["harmony"]
    assert s.di is s.dindex


def test_search_delegates(built, ds, baseline_ref):
    res = built["harmony"].search(ds["q"], k=TEST_K, nprobe=TEST_NPROBE)
    np.testing.assert_allclose(
        res.dists, baseline_ref.dists, rtol=1e-4, atol=1e-4
    )


def test_build_with_uniform_profile(spark, ds):
    # No profile queries → uniform planner profile; still builds/searches.
    cfg = HarmonyConfig(n_nodes=2, mode="harmony", nlist=8,
                        prewarm_per_cluster=4)
    s = HarmonySearcher.build(spark, ds["df"], cfg)
    try:
        res = s.search(ds["q"][:4], k=3, nprobe=2)
        assert res.ids.shape == (4, 3)
    finally:
        s.di.unpersist()


def test_build_two_nodes_dimension(spark, ds):
    cfg = HarmonyConfig(n_nodes=2, mode="dimension", nlist=8,
                        prewarm_per_cluster=4)
    s = HarmonySearcher.build(spark, ds["df"], cfg)
    try:
        assert s.di.plan.b_dim == 2
        res = s.search(ds["q"][:4], k=3, nprobe=8)
        from repro.baseline.faiss_lite import search_ivf_flat
        from repro.ivf.index import build_ivf

        ref = search_ivf_flat(build_ivf(ds["x"], 8), ds["q"][:4], 3, 8)
        np.testing.assert_allclose(res.dists, ref.dists, rtol=1e-4,
                                   atol=1e-4)
    finally:
        s.di.unpersist()
