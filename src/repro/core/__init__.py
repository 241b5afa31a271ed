"""Dangoron — the paper's core contribution.

- ``bounds``     — Eq. 2 temporal upper bounds (exact-ci and worst-case
                   modes) and the sound triangle (horizontal) bound;
- ``jumping``    — the vectorized frontier kernel: per block-pair tile,
                   evaluate → jump (binary search on the monotone bound)
                   → land → re-evaluate, exactly as Fig. 2;
- ``dangoron``   — the Spark engine: mapInPandas over the cached pair
                   sketch, Spark accumulators for pruning statistics;
- ``horizontal`` — pivot-based horizontal pruning expressed as DataFrame
                   filters, with cogrouped exact evaluation of survivors.
"""
