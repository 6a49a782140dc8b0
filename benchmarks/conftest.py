"""Benchmark fixtures: session-shared dataset bundles at bench scale.

Builds (IVF training + Spark pre-assign) are expensive, so all table
benchmarks share one :class:`DatasetBundle` per dataset. Scale with
``BENCH_SF`` (default 0.01 ≈ 6-22K vectors per dataset).
"""
import os

import pytest

from repro.experiments.runner import DatasetBundle, ExperimentConfig

BENCH_CFG = ExperimentConfig(sf=float(os.environ.get("BENCH_SF", "0.01")))


@pytest.fixture(scope="session")
def bundles(spark):
    """Factory returning (and caching) a bundle per dataset name."""
    cache: dict[str, DatasetBundle] = {}

    def get(name: str) -> DatasetBundle:
        if name not in cache:
            cache[name] = DatasetBundle(spark, name, BENCH_CFG)
        return cache[name]

    yield get
    for b in cache.values():
        b.close()
