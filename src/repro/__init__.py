"""SOFA reproduction package (see DESIGN.md).

BLAS thread pools are pinned to one thread per process *before* NumPy
loads anywhere in this package: the Spark layer runs 16 Python workers
per machine, and an unpinned OpenBLAS would oversubscribe 16x16
threads. This mirrors the paper's setup of one OMP thread per core
(they size FAISS's thread pool to the core count; our "cores" are
partitions, each a single-threaded worker). Override via environment.
"""
import os as _os

for _var in ("OPENBLAS_NUM_THREADS", "OMP_NUM_THREADS", "MKL_NUM_THREADS",
             "NUMEXPR_NUM_THREADS"):
    _os.environ.setdefault(_var, "1")
