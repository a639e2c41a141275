"""Synthetic stand-ins for the paper's three evaluation datasets."""
from .datasets import DATASETS, Dataset, winlog, ycsb, yelp

__all__ = ["DATASETS", "Dataset", "winlog", "ycsb", "yelp"]
