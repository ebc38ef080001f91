"""Synthetic stand-ins for the paper's datasets (Table 4) + §8.4 noise."""
from .noise import add_noise
from .schemas import DATASETS, PHI1, PHI2, DatasetSpec, running_example

__all__ = ["DATASETS", "PHI1", "PHI2", "DatasetSpec", "add_noise", "running_example"]
