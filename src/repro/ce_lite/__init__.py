"""CE-benchmark substitute: synthetic graph datasets with m:n joins."""
from .datasets import DATASETS, load_dataset
from .queries import bind_query, random_query, true_stats

__all__ = ["DATASETS", "load_dataset", "random_query", "bind_query", "true_stats"]
