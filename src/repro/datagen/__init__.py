"""Synthetic dataset generators standing in for the paper's crawled data."""
from repro.datagen.truthdata import TruthDataset, birthplaces_lite, heritages_lite
from repro.datagen.workers import SimulatedWorker, simulate_workers

__all__ = [
    "TruthDataset",
    "birthplaces_lite",
    "heritages_lite",
    "SimulatedWorker",
    "simulate_workers",
]
