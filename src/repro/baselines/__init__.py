"""Comparison methods of the evaluation: TFC, FCTree, RAND, IMP."""
from .fctree import FCTreePipeline
from .info_gain import info_gain, info_gain_from_codes
from .random_gen import RandomGenPipeline
from .tfc import TFCPipeline

__all__ = [
    "TFCPipeline",
    "FCTreePipeline",
    "RandomGenPipeline",
    "info_gain",
    "info_gain_from_codes",
]
