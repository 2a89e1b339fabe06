"""Reproduction of "Multivariate Time Series Cleaning under Speed
Constraints" (MTCSC, SIGMOD 2024) in PySpark.

Layout: :mod:`repro.core` holds the paper's algorithms (MTCSC-G/L/C/A,
MTCSC-Uni) plus the Spark dataflow layer; :mod:`repro.baselines` holds
the nine competing methods; :mod:`repro.datasets`, :mod:`repro.errors`,
:mod:`repro.metrics` and :mod:`repro.mining` are the experiment
substrate.  See DESIGN.md for the map from paper artefacts to modules.
"""
