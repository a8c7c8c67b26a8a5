"""Reproduce paper Figs. 12/13: rate-distortion, single- and
multi-frame."""
import _session  # noqa: F401
from repro.analysis import experiments as E

if __name__ == "__main__":
    single = E.rate_distortion_single(n=20_000)
    print(E.format_rows(single, "Fig. 12 — rate-distortion, single frame"))
    multi = E.rate_distortion_multi(n=20_000, frames=16)
    print(E.format_rows(multi, "Fig. 13 — rate-distortion, multi-frame (batch=16)"))
