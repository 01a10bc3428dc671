"""Dataset registry for the experiment harnesses.

Six synthetic stand-ins for the paper's KONECT graphs (DESIGN.md §3),
each decomposed on both sides — twelve dataset-sides, named like the
paper: ``ItU``, ``ItV``, ..., ``TrU``, ``TrV``. Following the paper's
convention, ``U`` labels the side with more wedges (the generators are
calibrated so the generated ``u`` column is that side — asserted by
``tests/test_generators.py``).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro.graph.generators import CONFIGS, dataset_edges

#: dataset keys in the paper's presentation order
NAMES: list[str] = list(CONFIGS)

#: (name, side) pairs in the paper's column order: ItU, ItV, DeU, ...
SIDES: list[tuple[str, str]] = [(n, s) for n in NAMES for s in ("u", "v")]


def label(name: str, side: str) -> str:
    """Paper-style label, e.g. ``("tr", "u") -> "TrU"``."""
    return name.capitalize() + side.upper()


def load(spark: SparkSession, name: str, scale: str | float = "bench") -> DataFrame:
    """Materialized (checkpointed) edge DataFrame for a dataset."""
    return dataset_edges(spark, name, scale).localCheckpoint()
