"""Reproduction of Azimov & Grigorev, "Context-free path querying by
matrix multiplication" (GRADES/PODS 2018), on PySpark.

Entry points:

* :func:`repro.core.api.graph_parse` — evaluate a CFPQ with any engine.
* :mod:`repro.bench.harness` — regenerate the paper's Tables 1 and 2.

See DESIGN.md for the system map and EXPERIMENTS.md for paper-vs-here
numbers.
"""

__all__ = ["cfg", "graphs", "core", "baseline", "bench"]
