"""LCP-FSM — per-frame method selection state machine (§7.2, Fig. 3).

The comparison between LCP-S and LCP-T needs an actual LCP-T run per
frame (its size varies frame to frame) while LCP-S's size is estimated
from the most recent LCP-S frame. The FSM throttles those LCP-T test
runs: every time the comparison picks LCP-S again, the test interval
doubles (S2X → S4X → …); a temporal win resets to comparing every
frame. With the cap below, at most 1 in 2 frames is tested in the
steady spatial state beyond the first few, keeping selection overhead
under the paper's 5 % bound while retaining high selection accuracy.
"""
from __future__ import annotations

MAX_INTERVAL = 32


class LCPFSM:
    """States: COMPARE (interval=1) and SkX (test LCP-T every k frames)."""

    def __init__(self) -> None:
        self.interval = 1  # test LCP-T every `interval` frames
        self.since_test = 0

    @property
    def state(self) -> str:
        return "COMPARE" if self.interval == 1 else f"S{self.interval}X"

    def should_test(self) -> bool:
        """Whether the next frame runs the LCP-S/LCP-T comparison."""
        return self.since_test + 1 >= self.interval

    def record(self, tested: bool, winner: str | None) -> None:
        """Advance the machine after compressing one frame.

        ``winner`` is "spatial"/"temporal" when ``tested``, else None.
        """
        if not tested:
            self.since_test += 1
            return
        self.since_test = 0
        if winner == "temporal":
            self.interval = 1
        else:
            self.interval = min(self.interval * 2, MAX_INTERVAL)

    def reset(self) -> None:
        self.interval = 1
        self.since_test = 0
