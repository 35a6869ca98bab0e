"""Baselines the paper compares against: Yen [27] (in repro.core.yen),
FindKSP [21] and CANDS [26]."""
from .cands import CANDS, CANDSStats
from .findksp import find_ksp

__all__ = ["CANDS", "CANDSStats", "find_ksp"]
