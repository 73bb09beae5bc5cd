"""Workload generators for the three experiment families:

* ``tpch_queries`` — random multi-way join queries over the TPC-H-lite
  join graph (Fig. 7 multi-query performance),
* ``synthetic`` — the ILP environment of Fig. 9 and the R-S-T-U
  adaptive scenarios of Fig. 8.
"""
