"""Faithful one-pass streaming simulators of REPT and the baselines.

Each module implements one paper algorithm as a sequential per-processor
(or per-trial) function over numpy edge arrays; :mod:`repro.stream.engine`
fans trials out as Spark tasks (a "processor" of the paper = one task).
"""
