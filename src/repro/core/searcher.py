"""User-facing Harmony searcher: build (plan → distribute) + search.

Mirrors the paper's ``-Mode`` parameter: ``harmony`` (adaptive grid via
the cost model), ``vector`` (Harmony-vector, ``B_dim=1``) and
``dimension`` (Harmony-dimension, ``B_vec=1``), plus the pruning /
scheduling / α knobs of §5 "Parameters".
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field, replace

import numpy as np
from pyspark.sql import DataFrame, SparkSession

from repro.cluster.layout import (
    DistributedIndex,
    assign_vectors,
    distribute,
    train_centroids,
)
from repro.cluster.machine import MachineModel
from repro.core.cost_model import (
    CostBreakdown,
    CostParams,
    QueryProfile,
    choose_plan,
)
from repro.core.engine import HarmonyEngine, SearchResult
from repro.core.partition import make_plan

#: Valid ``-Mode`` values (paper §5).
MODES = ("harmony", "vector", "dimension")


@dataclass(frozen=True)
class HarmonyConfig:
    """Build/search configuration (the paper's CLI parameters).

    ``n_nodes`` = ``-NMachine``; ``use_pruning`` =
    ``-Pruning_Configuration``; ``nlist`` = indexing parameter; ``alpha``
    = the cost model's imbalance weight; ``mode`` = ``-Mode``.
    """

    n_nodes: int = 4
    mode: str = "harmony"
    nlist: int = 64
    seed: int = 0
    schedule: str = "rotate"
    use_pruning: bool = True
    prewarm_per_cluster: int = 32
    machine: MachineModel = field(default_factory=MachineModel)
    alpha: float = 1.0
    balanced: bool = True
    #: Planner hints when no profile queries are supplied.
    nprobe_hint: int = 8
    k_hint: int = 10

    def __post_init__(self) -> None:
        if self.mode not in MODES:
            raise ValueError(f"mode {self.mode!r} not in {MODES}")


@dataclass
class HarmonySearcher:
    """A built distributed index plus its engine and planning record."""

    dindex: DistributedIndex
    config: HarmonyConfig
    engine: HarmonyEngine
    planned_cost: CostBreakdown | None = None

    @classmethod
    def build(
        cls,
        spark: SparkSession,
        df: DataFrame,
        config: HarmonyConfig = HarmonyConfig(),
        profile_queries: np.ndarray | None = None,
    ) -> "HarmonySearcher":
        """Train, add, plan and pre-assign the index (Fig. 10 stages).

        ``profile_queries`` — an optional sample workload the cost model
        profiles for skew; without it a uniform profile is assumed.
        """
        t0 = time.perf_counter()
        centroids = train_centroids(df, config.nlist, seed=config.seed)
        train_s = time.perf_counter() - t0

        t0 = time.perf_counter()
        adf = assign_vectors(spark, df, centroids).persist()
        counts = {
            int(r[0]): int(r[1])
            for r in adf.groupBy("cluster").count().collect()
        }
        sizes = np.array(
            [counts.get(c, 0) for c in range(len(centroids))], np.float64
        )
        add_s = time.perf_counter() - t0

        dim = centroids.shape[1]
        if profile_queries is not None:
            profile = QueryProfile.from_queries(
                centroids, sizes, np.asarray(profile_queries, np.float32),
                config.nprobe_hint, config.k_hint,
            )
        else:
            profile = QueryProfile.uniform(
                len(centroids), dim, sizes,
                n_queries=max(1, 100), nprobe=config.nprobe_hint,
                k=config.k_hint,
            )
        weights = profile.probe_counts * profile.cluster_sizes
        cost = None
        # Fixed modes model the *traditional* distribution: clusters are
        # packed by size alone, blind to the query workload (paper §6.1's
        # Harmony-vector / Harmony-dimension baselines). Only adaptive
        # harmony packs by expected load (probe-weighted).
        if config.mode == "vector":
            plan = make_plan(config.n_nodes, config.n_nodes, 1, dim,
                             sizes, config.balanced)
        elif config.mode == "dimension":
            plan = make_plan(config.n_nodes, 1, config.n_nodes, dim,
                             sizes, config.balanced)
        else:
            plan, cost = choose_plan(
                config.n_nodes, profile,
                CostParams(
                    config.machine, config.alpha,
                    pruning_prior=0.6 if config.use_pruning else 0.0,
                ),
                balanced=config.balanced,
            )
        di = distribute(
            spark, adf, plan,
            prewarm_per_cluster=config.prewarm_per_cluster,
            train_seconds=train_s, add_seconds=add_s, centroids=centroids,
        )
        adf.unpersist()
        engine = HarmonyEngine(
            di, machine=config.machine, schedule=config.schedule,
            use_pruning=config.use_pruning,
        )
        return cls(di, config, engine, cost)

    @property
    def di(self) -> DistributedIndex:
        """Alias kept short for test ergonomics."""
        return self.dindex

    def search(
        self, queries: np.ndarray, k: int = 10, nprobe: int = 8
    ) -> SearchResult:
        """Run one query batch through the pipelined engine."""
        return self.engine.search(queries, k=k, nprobe=nprobe)

    def with_engine(self, **overrides) -> "HarmonySearcher":
        """A sibling searcher sharing the built index but with engine
        knobs overridden (schedule, pruning, waves, machine) — used by
        the ablation experiments without re-distributing the index."""
        n_waves = overrides.pop("n_waves", 4)
        cfg = replace(self.config, **{
            k: v for k, v in overrides.items()
            if k in ("schedule", "use_pruning", "machine")
        })
        eng = HarmonyEngine(
            self.dindex, machine=cfg.machine, schedule=cfg.schedule,
            use_pruning=cfg.use_pruning, n_waves=n_waves,
        )
        return HarmonySearcher(self.dindex, cfg, eng, self.planned_cost)
