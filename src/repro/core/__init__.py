"""Core of the reproduction: the REPT algorithm and its baselines.

Submodules:

* ``hashing``    — deterministic splitmix64 hashing shared by every engine.
* ``indicator``  — vectorized per-seed indicator counting over Spark DataFrames.
* ``estimators`` — estimator math (variance formulas, Graybill–Deal, NRMSE).
* ``rept_sql``   — batch-equivalent REPT engine (Algorithms 1 and 2).
* ``mascot_sql`` — batch-equivalent parallel-MASCOT engine.
* ``structured`` — Structured Streaming REPT job.
"""
