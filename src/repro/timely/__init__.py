"""Simulated timely-dataflow substrate.

Provides the dataflow concepts Megaphone is built on (Naiad-style logical
timestamps, antichain frontiers, capabilities, exchange channels, probes)
together with a discrete-event cluster model (per-worker clocks, per-process
NIC bandwidth queues) that supplies the latency/duration/memory axes of the
paper's evaluation.
"""
from repro.timely.order import Antichain, less_equal
from repro.timely.cost import CostModel
from repro.timely.engine import (
    Batch,
    Channel,
    InputHandle,
    Operator,
    OperatorInstance,
    Probe,
    Simulation,
)
from repro.timely.notificator import Notificator

__all__ = [
    "Antichain",
    "less_equal",
    "CostModel",
    "Batch",
    "Channel",
    "InputHandle",
    "Operator",
    "OperatorInstance",
    "Probe",
    "Simulation",
    "Notificator",
]
