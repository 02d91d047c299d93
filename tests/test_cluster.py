"""SimCluster semantics: state persistence, metering, reductions."""
import pytest

from repro.core.labels import payload_bytes
from repro.dist.cluster import SimCluster


def _counter_init(i):
    return {"id": i, "count": 0}


def _inc(node_id, st, payload):
    st["count"] += payload
    return st, st["count"]


def test_state_persists_across_supersteps_serial():
    c = SimCluster(None, 3, _counter_init)
    assert c.superstep(_inc, 2) == {0: 2, 1: 2, 2: 2}
    assert c.superstep(_inc, 3) == {0: 5, 1: 5, 2: 5}


def test_node_id_passed():
    c = SimCluster(None, 4, _counter_init)
    outs = c.superstep(lambda i, st, p: (st, i * 10), None)
    assert outs == {0: 0, 1: 10, 2: 20, 3: 30}


def test_broadcast_metering():
    c = SimCluster(None, 4, _counter_init)
    payload = list(range(100))
    c.superstep(_inc_noop, payload)
    assert c.comm.broadcast_bytes == payload_bytes(payload) * 4
    assert c.comm.n_syncs == 1
    c.superstep(_inc_noop, payload, broadcast_payload=False)
    assert c.comm.n_syncs == 1  # orchestration payloads are not metered


def _inc_noop(node_id, st, payload):
    return st, None


def test_gather_and_allreduce_metering():
    c = SimCluster(None, 2, _counter_init)
    outs = {0: [1, 2], 1: [3]}
    c.gather(outs)
    assert c.comm.gather_bytes == payload_bytes(outs)
    merged = c.allreduce_or({0: [(1, 2)], 1: [(3, 4), (1, 2)]})
    assert merged == {(1, 2), (3, 4)}
    assert c.comm.allreduce_bytes > 0
    assert c.comm.total_bytes() == (
        c.comm.broadcast_bytes + c.comm.gather_bytes + c.comm.allreduce_bytes
    )


def test_map_states_read_only():
    c = SimCluster(None, 3, _counter_init)
    before = c.comm.total_bytes()
    assert c.map_states(lambda i, st: st["id"]) == {0: 0, 1: 1, 2: 2}
    assert c.comm.total_bytes() == before


# --------------------------------------------------------------------- #
# Spark-backed cluster (RDD partition per node).
# --------------------------------------------------------------------- #
def test_state_persists_across_supersteps_spark(spark):
    c = SimCluster(spark, 4, _counter_init)
    try:
        assert c.superstep(_inc, 1) == {0: 1, 1: 1, 2: 1, 3: 1}
        assert c.superstep(_inc, 5) == {0: 6, 1: 6, 2: 6, 3: 6}
        assert c.map_states(lambda i, st: st["count"]) == {i: 6 for i in range(4)}
    finally:
        c.free()


def _record_own_id(node_id, st, payload):
    st["vals"].append(node_id)
    return st, None


def test_spark_node_isolation(spark):
    """Mutating one node's state must never leak to another node."""
    c = SimCluster(spark, 3, lambda i: {"vals": []})
    try:
        c.superstep(_record_own_id, None)
        c.superstep(_record_own_id, None)
        out = c.map_states(lambda i, st: list(st["vals"]))
        assert out == {0: [0, 0], 1: [1, 1], 2: [2, 2]}
    finally:
        c.free()
