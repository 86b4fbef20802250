"""Core Hercules algorithms: summarizations, tree, index, query answering.

Everything in this package is pure NumPy and operates on one partition's
series matrix; the Spark layer (:mod:`repro.spark`) fans these functions
out across partitions via ``mapInPandas``.
"""
