"""Vertex-cut streaming partitioners (Table I) behind one registry.

Importing this package registers: ``hashing``, ``dbh``, ``greedy``,
``hdrf``, ``mint``, ``clugp``, ``clugp_s``, ``clugp_g``.
"""
from repro.partitioners import (  # noqa: F401 — imports register algorithms
    clugp_adapter,
    greedy,
    hashing,
    hdrf,
    mint,
)
from repro.partitioners.base import (  # noqa: F401
    PartitionResult,
    all_partitioners,
    get_partitioner,
    partition_spark,
)
