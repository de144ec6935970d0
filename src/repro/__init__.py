"""Reproduction of "Incremental View Maintenance for Property Graph Queries"
(Szárnyas, SIGMOD 2018 SRC) on Spark DataFrames.

Subpackages: ``graph`` (property graph substrate + generators), ``cypher``
(openCypher-fragment front-end), ``algebra`` (GRA/NRA IRs + rewrites),
``fra`` (batch evaluator), ``ivm`` (incremental engine), ``core`` (façade +
recompute baseline), ``bench`` (workloads, harness, tables). Entry point:
:func:`repro.core.session.prepare_view`.
"""
