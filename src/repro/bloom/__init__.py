"""Probabilistic membership substrate for Prob-Drop (§5.1.2)."""
from repro.bloom.bloom import BloomFilter  # noqa: F401
