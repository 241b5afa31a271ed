"""Tomborg — the paper's benchmark generator for correlation workloads.

Pipeline (paper §3): (1) draw a target correlation matrix C from a
user-specified distribution (``distributions``), (2) generate series
spectra in frequency space with a controllable energy-concentration
profile (``generator``), (3) map spectra to real time series with a
real-valued variant of the inverse DFT (``spectra``) — an isometry, so
inner products (hence correlations) survive the transform exactly.
"""
