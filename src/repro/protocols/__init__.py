"""Checkpointing protocols under evaluation (paper §III)."""
from .base import NoneProtocol, Protocol, RecoveryPlan, UnsupportedTopologyError
from .cic import CICProtocol
from .coordinated import CoordinatedProtocol
from .uncoordinated import UncoordinatedProtocol

PROTOCOLS = {
    "none": NoneProtocol,
    "COOR": CoordinatedProtocol,
    "UNC": UncoordinatedProtocol,
    "CIC": CICProtocol,
}

__all__ = [
    "Protocol",
    "NoneProtocol",
    "CoordinatedProtocol",
    "UncoordinatedProtocol",
    "CICProtocol",
    "RecoveryPlan",
    "UnsupportedTopologyError",
    "PROTOCOLS",
]
