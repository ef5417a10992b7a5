"""Reproduction of *Reproducible Floating-Point Aggregation in RDBMSs*
(Müller, Arteaga, Hoefler, Alonso — ICDE 2018) on PySpark + NumPy.

Packages: :mod:`repro.core` (the reproducible summation machinery),
:mod:`repro.aggregate` (single-node GROUPBY operators and tuning),
:mod:`repro.spark` (the reproducible GROUP BY SUM for Spark DataFrames),
plus the provided :mod:`repro.synth_data` generators and the
:mod:`repro.oracle` DuckDB equivalence checker. See DESIGN.md.
"""

__version__ = "0.1.0"
