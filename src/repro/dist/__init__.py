"""Distributed-memory layer: a simulated q-node cluster over Spark RDDs.

Implements the paper's §5 algorithms (DGLL, PLaNT, Hybrid, DparaPLL) and
§6 query modes, with all inter-node traffic flowing through accounted
SimCluster primitives (broadcast, gather, all-reduce).
"""
