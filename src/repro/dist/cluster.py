"""SimCluster — q logical cluster nodes realised as a partitioned RDD.

Each node's state (its shard of the label set, its Common Label Table,
its counters) lives in one RDD partition and persists across supersteps;
a superstep is a ``map`` with ``preservesPartitioning=True``. The driver
plays the MPI runtime: payloads move as Spark broadcasts (MPI_Bcast),
per-node outputs return via ``collect`` (MPI_Gather), and redundancy
bitvectors are OR-combined on the driver (MPI_Allreduce). Every such
event is metered in ``CommCounter`` — the paper's scalability story is
precisely about this traffic (§5.2: PLaNT's zero label traffic).

``spark=None`` degrades to an in-process list of node states running the
same superstep functions serially — used by fast unit tests; the Spark
path is exercised by integration tests and benchmarks.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark import StorageLevel
from pyspark.sql import SparkSession

from repro.core.labels import payload_bytes


@dataclass
class CommCounter:
    """Metered inter-node traffic (bytes are pickled payload sizes)."""

    broadcast_bytes: int = 0  # payload bytes × q receivers (delivered volume)
    gather_bytes: int = 0  # node→driver payloads
    allreduce_bytes: int = 0
    n_syncs: int = 0

    def total_bytes(self) -> int:
        return self.broadcast_bytes + self.gather_bytes + self.allreduce_bytes

    def as_dict(self) -> dict:
        return {
            "broadcast_bytes": self.broadcast_bytes,
            "gather_bytes": self.gather_bytes,
            "allreduce_bytes": self.allreduce_bytes,
            "total_bytes": self.total_bytes(),
            "n_syncs": self.n_syncs,
        }


class SimCluster:
    """q logical nodes with persistent per-node state.

    ``init_fn(node_id) -> state`` builds each node's initial state. A
    superstep applies ``fn(node_id, state, payload) -> (state', out)`` on
    every node and returns ``{node_id: out}``; state' replaces the node
    state for subsequent supersteps.
    """

    def __init__(self, spark: SparkSession | None, q: int, init_fn):
        self.spark = spark
        self.q = q
        self.comm = CommCounter()
        if spark is None:
            self._states = {i: init_fn(i) for i in range(q)}
            self._rdd = None
        else:
            sc = spark.sparkContext
            self._rdd = (
                sc.parallelize([(i, None) for i in range(q)], q)
                .partitionBy(q, lambda k: k)
                .map(lambda kv: (kv[0], init_fn(kv[0])), preservesPartitioning=True)
                .persist(StorageLevel.MEMORY_AND_DISK)
            )
            self._rdd.count()

    # ------------------------------------------------------------------ #
    def superstep(self, fn, payload=None, *, broadcast_payload=True) -> dict:
        """Run ``fn`` on every node; meter payload delivery if requested.

        ``broadcast_payload=False`` marks driver-side orchestration data
        (e.g. root-id ranges) that the paper does not count as label
        traffic — node ids and rank metadata are replicated at load time.
        """
        if payload is not None and broadcast_payload:
            self.comm.broadcast_bytes += payload_bytes(payload) * self.q
            self.comm.n_syncs += 1
        if self.spark is None:
            outs = {}
            for i in range(self.q):
                self._states[i], outs[i] = fn(i, self._states[i], payload)
            return outs
        sc = self.spark.sparkContext
        pay_bc = sc.broadcast(payload)
        step = (
            self._rdd.map(
                lambda kv: (kv[0], fn(kv[0], kv[1], pay_bc.value)),
                preservesPartitioning=True,
            )
            .persist(StorageLevel.MEMORY_AND_DISK)
        )
        outs = dict(step.map(lambda kv: (kv[0], kv[1][1])).collect())
        new_rdd = step.map(
            lambda kv: (kv[0], kv[1][0]), preservesPartitioning=True
        ).persist(StorageLevel.MEMORY_AND_DISK)
        new_rdd.count()
        self._rdd.unpersist()
        step.unpersist()
        pay_bc.unpersist()
        self._rdd = new_rdd
        return outs

    def gather(self, outs: dict) -> dict:
        """Meter node→driver movement of superstep outputs (MPI_Gather)."""
        self.comm.gather_bytes += payload_bytes(outs)
        return outs

    def allreduce_or(self, bitvectors: dict) -> set:
        """OR-combine per-node redundancy sets (MPI_Allreduce on bitvectors).

        Metered at the paper's cost: one bitvector (len = #labels checked)
        contributed per node.
        """
        self.comm.allreduce_bytes += sum(
            payload_bytes(b) for b in bitvectors.values()
        )
        out: set = set()
        for b in bitvectors.values():
            out |= set(b)
        return out

    # ------------------------------------------------------------------ #
    def map_states(self, fn) -> dict:
        """Read-only pass over node states (not metered; local analytics)."""
        if self.spark is None:
            return {i: fn(i, st) for i, st in self._states.items()}
        return dict(self._rdd.map(lambda kv: (kv[0], fn(kv[0], kv[1]))).collect())

    def free(self) -> None:
        if self._rdd is not None:
            self._rdd.unpersist()
            self._rdd = None
