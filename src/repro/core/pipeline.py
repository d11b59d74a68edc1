"""GMS processing pipeline (paper §5.4, Listing 3; Fig. 2 stages 1–5).

A benchmark run is: load graph → build representation → (optional)
preprocess → kernel → gather. ``Pipeline`` wires user-supplied stage
callables with the metric harness so each stage is separately timed —
the platform's "fine-grained analysis" (§4.3 ``fg``).

Stages are plain callables, so swapping a preprocessing routine (stage
3) or a kernel (stage 4) is one argument — the modularity levels 3–5 of
Fig. 2. Set-representation choice (level 5+) travels inside the kernel
via ``repro.core.sets.make_set_factory``.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Callable

from pyspark.sql import SparkSession

from repro.core.graph import Graph


@dataclass
class Pipeline:
    """One configured benchmark: named stages over a Graph."""

    spark: SparkSession
    load: Callable[[], Graph]
    preprocess: Callable[[Graph], object] | None = None
    kernel: Callable[[Graph, object], object] = None
    gather: Callable[[object], int] = None
    stage_times: dict = field(default_factory=dict)

    def run(self) -> tuple[object, dict]:
        """Execute all stages; returns (kernel result, per-stage seconds)."""
        t0 = time.perf_counter()
        graph = self.load()
        graph.adjacency().count()  # force representation build (stage 1–2)
        self.stage_times["load+represent"] = time.perf_counter() - t0

        prep = None
        if self.preprocess is not None:
            t0 = time.perf_counter()
            prep = self.preprocess(graph)
            self.stage_times["preprocess"] = time.perf_counter() - t0

        t0 = time.perf_counter()
        out = self.kernel(graph, prep)
        self.stage_times["kernel"] = time.perf_counter() - t0

        if self.gather is not None:
            t0 = time.perf_counter()
            self.stage_times["patterns"] = self.gather(out)
            self.stage_times["gather"] = time.perf_counter() - t0
        return out, dict(self.stage_times)
