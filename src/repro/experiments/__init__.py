"""Experiment harnesses reproducing the paper's evaluation (Section VII).

One module per figure family; each returns structured rows and can
render them as markdown tables for EXPERIMENTS.md:

* ``fig7`` — multi-query performance on TPC-H-lite (throughput, memory,
  latency; strategies FI/SI ≈ independent, FS/SS ≈ shared, CMQO = mqo),
* ``fig8`` — adaptive execution (latency timelines, crash behaviour,
  MIR-store introduction),
* ``fig9`` — ILP optimization (probe cost savings, problem sizes,
  optimization runtime).
"""
