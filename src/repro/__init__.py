"""PySpark reproduction of "Finding Label and Model Errors in Perception
Data With Learned Observation Assertions" (Kang et al., SIGMOD 2022).

Packages: :mod:`repro.core` (the LOA/Fixy contribution),
:mod:`repro.association` and :mod:`repro.perception` (substrates),
:mod:`repro.baselines` (ad-hoc model assertions, uncertainty sampling),
:mod:`repro.eval` (per-table experiment drivers). See DESIGN.md.
"""
