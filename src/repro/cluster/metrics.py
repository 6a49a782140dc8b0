"""Per-node and per-stage metering for the simulated cluster.

The engine records, for every pipeline stage, how many distance operations
each node executed and how many bytes/messages it exchanged with the
client. :class:`ClusterMetrics` aggregates these into the quantities the
paper reports: computation/communication breakdowns (Fig. 2b, Fig. 8),
load imbalance (§4.2.1 ``I(π)``), simulated elapsed time / QPS (Figs. 6-7)
and peak per-node memory (Table 5).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.cluster.machine import MachineModel


@dataclass
class StageRecord:
    """Counts for one synchronized stage, arrays indexed by node id."""

    label: str
    ops: np.ndarray
    bytes_down: np.ndarray  # client -> node (query slices, survivor sets)
    bytes_up: np.ndarray  # node -> client (partial sums, results)
    msgs: np.ndarray

    def comp_seconds(self, model: MachineModel) -> float:
        """Stage compute span: the slowest node's compute time."""
        return model.comp_time(float(self.ops.max(initial=0.0)))

    def comm_seconds(self, model: MachineModel) -> float:
        """Stage communication span: the busiest link's transfer time."""
        per_node = self.bytes_down + self.bytes_up
        if len(per_node) == 0:
            return 0.0
        i = int(np.argmax(per_node + self.msgs * 1e-9))
        return model.comm_time(float(per_node[i]), float(self.msgs[i]))


@dataclass
class ClusterMetrics:
    """Accumulated metering for one search (or workload) run."""

    n_nodes: int
    stages: list[StageRecord] = field(default_factory=list)
    client_ops: float = 0.0
    #: Per-node peak transient buffer bytes observed at any stage.
    peak_buffer_bytes: np.ndarray = None  # type: ignore[assignment]

    def __post_init__(self) -> None:
        if self.peak_buffer_bytes is None:
            self.peak_buffer_bytes = np.zeros(self.n_nodes)

    def record_stage(
        self,
        label: str,
        ops,
        bytes_down,
        bytes_up,
        msgs,
        buffer_bytes=None,
    ) -> None:
        """Append one stage; all arguments are length-``n_nodes`` arrays."""
        rec = StageRecord(
            label,
            np.asarray(ops, dtype=np.float64),
            np.asarray(bytes_down, dtype=np.float64),
            np.asarray(bytes_up, dtype=np.float64),
            np.asarray(msgs, dtype=np.float64),
        )
        self.stages.append(rec)
        if buffer_bytes is not None:
            self.peak_buffer_bytes = np.maximum(
                self.peak_buffer_bytes, np.asarray(buffer_bytes, np.float64)
            )

    # ---- aggregations -------------------------------------------------

    def node_ops(self) -> np.ndarray:
        """Total distance ops per node across all stages."""
        out = np.zeros(self.n_nodes)
        for s in self.stages:
            out += s.ops
        return out

    def total_bytes(self) -> float:
        """All bytes moved over the network in both directions."""
        return float(
            sum(s.bytes_down.sum() + s.bytes_up.sum() for s in self.stages)
        )

    def total_msgs(self) -> float:
        """All messages exchanged."""
        return float(sum(s.msgs.sum() for s in self.stages))

    def imbalance(self) -> float:
        """Std-dev of per-node total ops — the paper's ``I(π)`` measured
        on actual (not estimated) load."""
        return float(self.node_ops().std())

    def comp_seconds(self, model: MachineModel) -> float:
        """Sum of per-stage compute spans (critical-path compute)."""
        return sum(s.comp_seconds(model) for s in self.stages)

    def comm_seconds(self, model: MachineModel) -> float:
        """Sum of per-stage communication spans."""
        return sum(s.comm_seconds(model) for s in self.stages)

    def node_seconds(self, model: MachineModel) -> np.ndarray:
        """Per-node busy time: total compute and total communication of
        each node, composed by the model's overlap rule."""
        comp = np.zeros(self.n_nodes)
        n_bytes = np.zeros(self.n_nodes)
        msgs = np.zeros(self.n_nodes)
        for s in self.stages:
            comp += s.ops
            n_bytes += s.bytes_down + s.bytes_up
            msgs += s.msgs
        out = np.zeros(self.n_nodes)
        for n in range(self.n_nodes):
            out[n] = model.stage_time(
                model.comp_time(float(comp[n])),
                model.comm_time(float(n_bytes[n]), float(msgs[n])),
            )
        return out

    def simulated_seconds(self, model: MachineModel) -> float:
        """Simulated elapsed time of the query batch.

        * ``blocking`` mode models the synchronized baseline: global
          barriers between stages, so time is the sum of per-stage spans
          (compute + communication).
        * non-blocking mode models Harmony's pipelined/async execution:
          no global barriers — work streams through the nodes, so the
          batch finishes when the *bottleneck node* drains (lower-
          bounded by the longest single stage, which cannot be split).

        Client compute (centroid assignment, prewarm) precedes the
        distributed phase and is added serially in both modes.
        """
        t_client = model.comp_time(self.client_ops)
        if model.blocking:
            return t_client + sum(
                model.stage_time(
                    s.comp_seconds(model), s.comm_seconds(model)
                )
                for s in self.stages
            )
        if not self.stages:
            return t_client
        longest = max(
            model.stage_time(s.comp_seconds(model), s.comm_seconds(model))
            for s in self.stages
        )
        return t_client + max(float(self.node_seconds(model).max()),
                              longest)

    def breakdown(self, model: MachineModel) -> dict[str, float]:
        """Fig. 8-style shares: computation / communication / other."""
        comp = self.comp_seconds(model)
        comm = self.comm_seconds(model)
        other = model.comp_time(self.client_ops)
        return {"computation": comp, "communication": comm, "other": other}
