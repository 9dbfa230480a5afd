"""Reproduction of *Kaskade: Graph Views for Efficient Graph Analytics*
(da Trindade et al., ICDE 2020) as a PySpark codebase.

Subpackages:

- ``repro.prolog``   — mini Prolog inference engine (SWI-Prolog substitute)
- ``repro.core``     — the paper's contribution: schema/pattern IR,
  constraint mining, view enumeration, size estimation, cost model,
  knapsack view selection, view-based query rewriting
- ``repro.engine``   — Spark DataFrame graph execution engine (Neo4j
  substitute): property graphs, traversals, pattern matching, hybrid
  MATCH+SQL queries
- ``repro.views``    — connector & summarizer materialization, label
  propagation
- ``repro.datasets`` — synthetic Table III graphs (prov, dblp, soc,
  roadnet)
- ``repro.workload`` — queries Q1–Q8 and the § VII experiment harnesses

See DESIGN.md for the module map and substitution log, EXPERIMENTS.md
for paper-vs-measured numbers.
"""
