"""The paper's contribution: canonical hub labeling construction engines.

Shared-memory algorithms (seqPLL, LCC, GLL, SparaPLL) live here; the
distributed/cluster layer builds on these kernels from ``repro.dist``.
"""
