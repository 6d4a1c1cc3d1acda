"""Sequential branch-and-bound core: the paper's contribution.

Everything in this package is pure Python (no Spark imports) so the kernels
can run inside Spark tasks (``repro.dist``) and in-process (``repro.tables``)
alike, and so the correctness tests stay fast.
"""
