"""Synthetic dataset generators and the Table II dataset registry."""
from . import generators
from .datasets import DATASETS, STREETS, DatasetSpec, PaperNumbers, dataset_names, get_dataset

__all__ = [
    "generators",
    "DATASETS",
    "STREETS",
    "DatasetSpec",
    "PaperNumbers",
    "dataset_names",
    "get_dataset",
]
