"""Shared test fixtures: one tiny dataset + one built searcher per mode.

Building a distributed index costs several Spark jobs, so the engine /
searcher / layout tests share session-scoped builds instead of each
re-building. Everything is deterministic (seeded), so sharing does not
couple tests.
"""
import numpy as np
import pytest

from repro.baseline.faiss_lite import search_ivf_flat
from repro.core.searcher import HarmonyConfig, HarmonySearcher
from repro.ivf.index import build_ivf
from repro.vectors.generate import base_numpy, base_spark, queries_numpy
from repro.vectors.specs import get_spec

#: Tiny-scale knobs shared by the Spark integration tests.
TEST_SF = 0.0008  # 800 base vectors
TEST_NLIST = 16
TEST_K = 5
TEST_NPROBE = 4


@pytest.fixture(scope="session")
def ds(spark):
    """Tiny sift1m-analog artifacts: numpy base/queries, Spark DF, IVF."""
    spec = get_spec("sift1m")
    x = base_numpy(spec, TEST_SF)
    q = queries_numpy(spec, TEST_SF)[:16]
    df = base_spark(spark, spec, TEST_SF)
    ivf = build_ivf(x, TEST_NLIST)
    return {"spec": spec, "x": x, "q": q, "df": df, "ivf": ivf}


@pytest.fixture(scope="session")
def built(spark, ds):
    """One built searcher per mode over the tiny dataset."""
    out = {}
    for mode in ("harmony", "vector", "dimension"):
        cfg = HarmonyConfig(
            n_nodes=4, mode=mode, nlist=TEST_NLIST,
            prewarm_per_cluster=8, nprobe_hint=TEST_NPROBE, k_hint=TEST_K,
        )
        out[mode] = HarmonySearcher.build(
            spark, ds["df"], cfg, profile_queries=ds["q"]
        )
    yield out
    for s in out.values():
        s.di.unpersist()


@pytest.fixture(scope="session")
def baseline_ref(ds):
    """faiss_lite reference result at the shared test settings."""
    return search_ivf_flat(
        ds["ivf"], ds["q"], k=TEST_K, nprobe=TEST_NPROBE
    )


def assert_same_distances(dists, ref_dists, rtol=1e-4, atol=1e-4):
    """Distance-level equality between two (Q, k) result sets."""
    np.testing.assert_allclose(dists, ref_dists, rtol=rtol, atol=atol)
