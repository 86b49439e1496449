"""Intermediate Representation (IR) substrate (paper §III-B).

Each attribute value of a tuple is construed as a sentence and embedded
into a fixed-dimension similarity-preserving vector by one of four
methods: LSA, W2V, BERT(-sim), EmbDI(-lite). `api.build_irs` is the
uniform entry point producing a DataFrame with one row per tuple:
``(id, table, irs: array<array<double>>)`` of shape arity x ir_dim.
"""
from repro.ir.api import IR_KINDS, build_irs

__all__ = ["IR_KINDS", "build_irs"]
