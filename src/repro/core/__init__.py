"""CLASH core: query model, MIR enumeration, probe orders, cost model,
ILP construction, plan decoding and the multi-query optimizer."""
