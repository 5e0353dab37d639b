"""Synthetic dirty-ER benchmark datasets (paper Table 1 equivalents)."""
from .generator import generate, serialize_row, to_spark
from .registry import DISPLAY, SPECS, load, spec
from .schema import AttrSpec, DatasetSpec, mixed, textual

__all__ = [
    "AttrSpec", "DatasetSpec", "DISPLAY", "SPECS",
    "generate", "load", "mixed", "serialize_row", "spec", "textual",
    "to_spark",
]
