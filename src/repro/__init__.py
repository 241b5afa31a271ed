"""Reproduction of "Dangoron: Network Construction on Large-scale Time
Series Data across Sliding Windows" (SIGMOD-Companion '23).

Subpackages: ``tsio`` (time-series substrate), ``sketch`` (basic-window
sketch framework, Eq. 1), ``core`` (Dangoron: Eq.-2 jumping + horizontal
pruning), ``baselines`` (TSUBASA, naive, ParCorr, StatStream),
``tomborg`` (benchmark generator), ``streaming`` (incremental sketch
maintenance). See DESIGN.md for the system map and EXPERIMENTS.md for
paper-vs-measured numbers.
"""
import os as _os

# glibc hands every large (>128 KiB) allocation its own mmap and returns
# it to the OS on free, so each Arrow-kernel invocation re-faults tens of
# MB of pages — under this sandbox's virtualized kernel that costs whole
# seconds and drowns engine timing differences in allocation noise.
# Raising the mmap threshold keeps big numpy buffers on the heap where
# they are reused warm. Set at import time so the Spark JVM (launched
# later by the session fixture) passes it through to the Python workers
# that actually run the kernels.
_os.environ.setdefault("MALLOC_MMAP_THRESHOLD_", str(1 << 30))
_os.environ.setdefault("MALLOC_TRIM_THRESHOLD_", str(1 << 30))
