"""Synthetic dynamic-graph substrate.

The paper evaluates on SNAP graphs (Skitter, LiveJournal, Patents, Orkut)
and LDBC SNB SF10. Those are multi-million-edge downloads we cannot (and
per DESIGN.md should not) fetch; :mod:`repro.graphs.generators` produces
deterministic ~1/1000-scale synthetic stand-ins with the same *shape*
statistics (power-law degrees, hub structure, average-degree ordering,
edge labels for RPQs). :mod:`repro.graphs.updates` slices a generated
edge list into the paper's 90% initial / 10% update-stream protocol.
"""
from repro.graphs.generators import (  # noqa: F401
    GraphData,
    figure2_example,
    ldbc_like,
    livejournal_like,
    orkut_like,
    patents_like,
    skitter_like,
)
from repro.graphs.updates import Batch, split_stream, to_batches  # noqa: F401
