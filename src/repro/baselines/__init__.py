"""Baseline allocators: hash-random, METIS-like, Shard Scheduler."""
from repro.baselines.hashalloc import hash_alloc  # noqa: F401
from repro.baselines.metis_like import metis_like  # noqa: F401
from repro.baselines.shard_scheduler import shard_scheduler  # noqa: F401
