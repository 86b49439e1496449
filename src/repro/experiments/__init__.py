"""Experiment harnesses, one per paper table (§VI)."""
from repro.experiments.tables import (
    table2_datasets,
    table4_representation,
    table5_table6_matching,
    table7_transfer,
    table8_active_learning,
)

__all__ = [
    "table2_datasets",
    "table4_representation",
    "table5_table6_matching",
    "table7_transfer",
    "table8_active_learning",
]
