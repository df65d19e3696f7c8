"""Reference implementations of the paper's 8 bipartite matching algorithms.

Registry maps the paper's acronym to a matcher callable with signature
``matcher(v1, v2, w, t, **params) -> (k, 2) int64 pairs``.
"""
from .bah import bah
from .bmc import bmc
from .cnc import cnc
from .exc import exc
from .krc import krc
from .rca import rca
from .rsr import rsr
from .umc import umc

#: Paper acronym -> matcher callable.
ALGORITHMS = {
    "CNC": cnc,
    "RSR": rsr,
    "RCA": rca,
    "BAH": bah,
    "BMC": bmc,
    "EXC": exc,
    "KRC": krc,
    "UMC": umc,
}

#: Display order used throughout the paper's tables.
ALGORITHM_ORDER = ["CNC", "RSR", "RCA", "BAH", "BMC", "EXC", "KRC", "UMC"]

__all__ = [
    "ALGORITHMS",
    "ALGORITHM_ORDER",
    "bah",
    "bmc",
    "cnc",
    "exc",
    "krc",
    "rca",
    "rsr",
    "umc",
]
