"""Registry of every compressor in the evaluation (§8.1.3).

``all_codecs()`` returns the eight evaluated compressors (LCP + seven
baselines); TMC2 is constructed only by explicit request, mirroring
the paper's exclusion of TMC2 from the §8.2 result sections.
"""
from __future__ import annotations

from .base import BaseCodec
from .draco import Draco
from .lcp_codec import LCP
from .mdz import MDZ
from .sperr import SPERR
from .sz2 import SZ2
from .sz3 import SZ3
from .tmc13 import TMC13
from .tmc2 import TMC2
from .zfp import ZFP

_FACTORIES = {
    "lcp": LCP,
    "sz2": SZ2,
    "sz3": SZ3,
    "mdz": MDZ,
    "zfp": ZFP,
    "sperr": SPERR,
    "draco": Draco,
    "tmc13": TMC13,
    "tmc2": TMC2,
}

EVALUATED = ["lcp", "sz2", "sz3", "mdz", "zfp", "sperr", "draco", "tmc13"]


def make(name: str, **kwargs) -> BaseCodec:
    return _FACTORIES[name](**kwargs)


def all_codecs() -> list[BaseCodec]:
    """The compressors appearing in the paper's result tables."""
    return [make(n) for n in EVALUATED]
