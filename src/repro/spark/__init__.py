"""Data-parallel (Catalyst) formulations of the SURGE computations.

Input convention everywhere: a DataFrame of spatial objects with columns
``oid`` (long), ``x``/``y`` (double), ``w`` (double), ``t`` (double, seconds
since simulation epoch 0). ``repro.spark.io`` holds the schema and helpers.
"""
