"""Synthetic ER benchmark substrate.

The paper evaluates on nine dataset pairs (Table II), seven from the
public DeepMatcher benchmark suite and two private Peak AI datasets.
None ship with this container, so this package generates synthetic
equivalents with the same cardinalities, arities, train/test sizes and
clean/noisy character (see DESIGN.md §2 for the substitution argument).
"""
from repro.datasets.generate import ERDomainData, er_domain, er_domain_pandas
from repro.datasets.spec import DOMAINS, DomainSpec

__all__ = ["ERDomainData", "er_domain", "er_domain_pandas", "DOMAINS", "DomainSpec"]
