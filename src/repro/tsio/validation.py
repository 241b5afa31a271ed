"""Query-spec validation for sliding correlation queries.

The paper adopts the basic-window framework (StatStream / TSUBASA): a
query window is a whole number of basic windows and the slide step moves
the window by whole basic windows. ``SlidingSpec`` enforces that
alignment up front with actionable error messages instead of letting a
mis-aligned query silently produce wrong windows deep inside a kernel.
"""
from __future__ import annotations

from dataclasses import dataclass


@dataclass(frozen=True)
class SlidingSpec:
    """A sliding correlation-matrix query.

    Attributes
    ----------
    start, end:
        Query range ``r = (s, e)`` in timesteps; half-open ``[start, end)``.
    window:
        Query window size ``l`` in timesteps.
    step:
        Slide step ``η`` in timesteps.
    beta:
        Correlation threshold ``β``; matrix entries below it are zeroed
        (i.e. not emitted).
    bw:
        Basic-window size ``B`` in timesteps. ``start``, ``window`` and
        ``step`` must all be multiples of ``B``.
    """

    start: int
    end: int
    window: int
    step: int
    beta: float
    bw: int

    def __post_init__(self) -> None:
        if self.bw <= 0:
            raise ValueError(f"basic window size must be positive, got bw={self.bw}")
        if self.window <= 0:
            raise ValueError(f"query window size must be positive, got window={self.window}")
        if self.step <= 0:
            raise ValueError(f"slide step must be positive, got step={self.step}")
        if self.start < 0:
            raise ValueError(f"query start must be >= 0, got start={self.start}")
        if self.end <= self.start:
            raise ValueError(
                f"query range is empty: start={self.start}, end={self.end}"
            )
        if not -1.0 <= self.beta <= 1.0:
            raise ValueError(f"beta must be in [-1, 1], got beta={self.beta}")
        for name, v in (("start", self.start), ("window", self.window), ("step", self.step)):
            if v % self.bw != 0:
                raise ValueError(
                    f"{name}={v} is not a multiple of the basic window size bw={self.bw}; "
                    "the basic-window framework requires aligned queries "
                    "(re-run with an aligned value or a different bw)"
                )
        if self.window > self.end - self.start:
            raise ValueError(
                f"window={self.window} does not fit in range "
                f"[{self.start}, {self.end})"
            )

    # ---- derived quantities (all in basic-window units unless noted) ----

    @property
    def n_s(self) -> int:
        """Number of basic windows per query window (the paper's n_s)."""
        return self.window // self.bw

    @property
    def m(self) -> int:
        """Number of basic windows the window advances per slide."""
        return self.step // self.bw

    @property
    def bw0(self) -> int:
        """Basic-window index of the first query window's first bw."""
        return self.start // self.bw

    @property
    def n_windows(self) -> int:
        """Number of sliding windows γ+1 that fit in the query range."""
        return (self.end - self.start - self.window) // self.step + 1

    def n_bw(self, length: int) -> int:
        """Number of whole basic windows in a series of ``length`` steps."""
        return length // self.bw

    def window_bw_start(self, w: int) -> int:
        """First basic-window index covered by sliding window ``w``."""
        return self.bw0 + w * self.m

    def window_t_range(self, w: int) -> tuple[int, int]:
        """Timestep range [ws, we) covered by sliding window ``w``."""
        ws = self.start + w * self.step
        return ws, ws + self.window

    def validate_against(self, length: int) -> None:
        """Check the query fits a series of ``length`` timesteps."""
        if self.end > length:
            raise ValueError(
                f"query end={self.end} exceeds series length {length}"
            )
        if length % self.bw != 0:
            raise ValueError(
                f"series length {length} is not a multiple of bw={self.bw}; "
                "truncate the input or choose a dividing basic window"
            )
