"""Reproduction of "Efficient Fault Tolerance for Pipelined Query
Engines via Write-ahead Lineage" (Wang & Aiken, ICDE 2024).

Subpackages: :mod:`repro.core` (the contribution: write-ahead lineage +
recovery), :mod:`repro.engine` (pipelined-engine substrate),
:mod:`repro.queries` (TPC-H-lite), :mod:`repro.sparkbridge` (real-Spark
baseline + staged WAL), :mod:`repro.harness` (experiments).
"""
