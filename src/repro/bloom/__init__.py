"""Bloom-filter / bitvector substrate for sideways information passing."""
from .bloom import ExactBitvector, SparkBloomFilter, build_bitvector

__all__ = ["ExactBitvector", "SparkBloomFilter", "build_bitvector"]
