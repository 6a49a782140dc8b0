"""Shared CLI plumbing for the spark-submit jobs."""
from __future__ import annotations

import argparse

from repro.experiments.runner import ExperimentConfig


def parse_args(description: str, default_sf: float = 0.01):
    """Standard job arguments: scale factor, nodes, nlist, datasets."""
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--sf", type=float, default=default_sf,
                   help="scale factor (paper size x sf vectors)")
    p.add_argument("--nodes", type=int, default=4,
                   help="simulated worker nodes")
    p.add_argument("--nlist", type=int, default=48,
                   help="IVF cluster count")
    p.add_argument("--nprobe", type=int, default=8)
    p.add_argument("--k", type=int, default=10)
    p.add_argument("--datasets", nargs="*", default=None,
                   help="subset of dataset names (default: the 8 small)")
    return p.parse_args()


def config_from(args) -> ExperimentConfig:
    """Build the experiment config from parsed arguments."""
    return ExperimentConfig(
        sf=args.sf, n_nodes=args.nodes, nlist=args.nlist,
        nprobe=args.nprobe, k=args.k,
    )
