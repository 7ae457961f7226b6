"""Reproduction of PSPC (ICDE 2023): parallel shortest path counting.

Package layout (see DESIGN.md for the full map):

* ``repro.core`` — ESPC index builders (HP-SPC_s baseline, PSPC, Spark
  PSPC⁺), query evaluation, landmarks, §IV reductions, BFS oracle;
* ``repro.ordering`` — vertex-ordering schemes (degree / significant-path /
  tree-decomposition / hybrid);
* ``repro.graphgen`` / ``repro.graph`` — synthetic datasets and the graph
  substrate;
* ``repro.sim`` — thread/schedule cost model for the scaling experiments;
* ``repro.experiments`` — one module per evaluation table (Exp 1–8,
  Table III).
"""
