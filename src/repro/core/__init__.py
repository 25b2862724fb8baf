"""Core algorithms of the reproduction: constraints, phase I, phase II."""
from .constraints import CC, Cond, DC, Comp, OutsideComp, cc_relationship, pairwise_dc
from .pipeline import CExtensionResult, c_extension

__all__ = [
    "CC",
    "Cond",
    "DC",
    "Comp",
    "OutsideComp",
    "cc_relationship",
    "pairwise_dc",
    "CExtensionResult",
    "c_extension",
]
