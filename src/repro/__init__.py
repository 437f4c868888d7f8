"""Reproduction of IMDPP / Dysim (Teng et al., ICDE 2021).

Subpackages: ``data`` (synthetic social network + KG), ``kg``
(meta-graph relevance), ``graph`` (graph primitives, local and Spark),
``dynamics`` (the four IMDPP factors), ``diffusion`` (the two
equivalent engines), ``core`` (Dysim), ``baselines``, ``experiments``
(table harness). See DESIGN.md at the repo root.
"""

__version__ = "0.1.0"
