"""Reproduction of Huang & Wu, "Reptile: Aggregation-level Explanations for
Hierarchical Data" (SIGMOD 2022), on PySpark.

Importing this package pins BLAS to a single thread (best-effort: only
effective if numpy has not been imported yet) so the dense-matrix baselines
match the paper's single-threaded Lapack setup; conftest.py and the jobs do
the same before importing numpy.
"""
import os as _os

for _v in ("OPENBLAS_NUM_THREADS", "OMP_NUM_THREADS", "MKL_NUM_THREADS"):
    _os.environ.setdefault(_v, "1")
