"""Simulated-testbed accounting: bytes moved, time, and memory.

The paper reports, per system: total time T, computation time T_R,
communication time T_C = T - T_R, communication volume C, and peak
per-machine memory M (Table 1). Our cluster is simulated on one Spark
session, so:

- **C (bytes)** is *exact accounting on the real data*: every operator
  reports how many tuples/adjacency lists cross simulated machine
  boundaries (push shuffles count tuples to remote machines; pull
  extends count distinct (machine, remote-vertex) adjacency pulls).
- **T_R** is the *measured* Spark wall time of that system's actual
  dataflow, plus modelled CPU costs that our shared engine cannot
  differentiate (per-tuple serialisation for pushed tuples; per-access
  key/value-store overhead for BENU — the paper's stated culprit for
  BENU's slow computation).
- **T_C** is modelled: accounted bytes over a 10 Gbps link plus per-RPC
  overheads (pull mode batches RPCs; BENU pays per access).
- **M** is peak live intermediate bytes per machine (scheduler-simulated
  for HUGE/BENU; max join-operand residency for BFS pushing systems).

Constants below are calibration knobs for the simulated testbed; they
are documented here once and used by every table harness, so changing
them re-shapes every table consistently. Absolute times are not
comparable with the paper's Rust cluster — shapes and ratios are.
"""
from __future__ import annotations

from dataclasses import dataclass, field

BYTES_PER_VID = 8  # vertex id width (i64), as the paper's compact arrays

# The paper's testbed links are 10 Gbps; our twins are ~3 orders of
# magnitude smaller than the paper's graphs, so the simulated testbed
# scales per-link bandwidth down by the same factor (1 MB/s) to preserve
# the communication/computation balance — otherwise every system's T_C
# would vanish at mini-scale and Table 1's shape would be unmeasurable.
NETWORK_BYTES_PER_S = 1e6

# Effective network utilisation per communication pattern: streamed wco
# pushes reach ~58% (paper Table 1, BiGJoin); HUGE's batched pulls reach
# 86-94% (Exp-4). A barrier hash shuffle whose operands fit the §4.3
# in-memory buffer behaves like a streamed push; once operands *spill*,
# the shuffle interleaves with disk sorting and utilisation collapses —
# the paper's SEED moved 537 GB in 1193 s over 10 x 10 Gbps, ~4%
# effective.
UTIL_BARRIER_SHUFFLE = 0.6  # non-spilling hash shuffle
UTIL_SPILLED_SHUFFLE = 0.1  # operands beyond the buffer
UTIL_STREAM_PUSH = 0.6
UTIL_BATCHED_PULL = 0.9

# §4.3 buffered hash join: operands beyond the constant in-memory buffer
# are external-merge-sorted onto disk and read back — a size-dependent
# computation cost (this, plus the collapsed shuffle utilisation above,
# is what made SEED's 537 GB shuffle catastrophic in the paper's
# Table 1). Threshold and disk rate are mini-scaled together with the
# network constant above.
SPILL_THRESHOLD_BYTES = 768e3  # per machine
DISK_BYTES_PER_S = 5e5


def op_spills(op: "OpStats", k: int) -> bool:
    """Whether a (barrier) join's shuffled operands overflow the buffer."""
    return op.barrier and op.buffer_bytes / max(1, k) > SPILL_THRESHOLD_BYTES

RPC_OVERHEAD_S = 50e-6  # one batched GetNbrs round trip
KV_ACCESS_S = 300e-6  # BENU: external k/v store get (Cassandra-like RTT)
SERIALIZE_S_PER_TUPLE_FIELD = 100e-9  # (de)serialising one pushed field
JOIN_SORT_S_PER_TUPLE = 250e-9  # buffered hash join: external merge sort (§4.3)
PULL_CPU_S_PER_ACCESS = 3e-9  # HUGE: zero-copy cache reference per access


@dataclass
class OpStats:
    """Per-operator execution statistics gathered by the engine."""

    name: str
    out_rows: int = 0
    out_arity: int = 0
    wall_s: float = 0.0
    push_bytes: float = 0.0  # bytes shuffled to remote machines
    pull_bytes: float = 0.0  # bytes of adjacency lists pulled
    pull_requests: int = 0  # distinct (machine, remote vertex) pulls
    accesses: int = 0  # total adjacency accesses (cached or not)
    barrier: bool = False  # push via barrier hash shuffle (vs streamed)
    sort_tuples: int = 0  # tuples through the buffered-join merge sort
    buffer_bytes: float = 0.0  # hash-join operand bytes (spill candidate)

    @property
    def comm_bytes(self) -> float:
        return self.push_bytes + self.pull_bytes

    @property
    def out_bytes(self) -> float:
        return self.out_rows * self.out_arity * BYTES_PER_VID


@dataclass
class RunStats:
    """Aggregated statistics of one full query execution."""

    ops: list[OpStats] = field(default_factory=list)
    result_count: int = 0
    k: int = 1
    kv_model: bool = False  # BENU: charge KV_ACCESS_S per adjacency access
    peak_mem_bytes: float = 0.0  # set by the memory model of the runner

    def add(self, s: OpStats) -> None:
        self.ops.append(s)

    @property
    def comm_bytes(self) -> float:
        return sum(o.comm_bytes for o in self.ops)

    @property
    def push_bytes(self) -> float:
        return sum(o.push_bytes for o in self.ops)

    @property
    def pull_bytes(self) -> float:
        return sum(o.pull_bytes for o in self.ops)

    @property
    def measured_wall_s(self) -> float:
        return sum(o.wall_s for o in self.ops)

    # -- time composition (see module docstring) ---------------------------
    @property
    def t_comm_s(self) -> float:
        """Modelled communication time: the cluster's k links move data in
        parallel at the pattern's effective utilisation (constants
        above); RPC overheads add per batched pull request. BENU's
        per-access k/v overhead is charged to computation, matching the
        paper's T_R attribution."""
        k = max(1, self.k)
        wire = 0.0
        for o in self.ops:
            if o.push_bytes:
                if o.barrier:
                    util = (
                        UTIL_SPILLED_SHUFFLE
                        if op_spills(o, k)
                        else UTIL_BARRIER_SHUFFLE
                    )
                else:
                    util = UTIL_STREAM_PUSH
                wire += o.push_bytes / (k * NETWORK_BYTES_PER_S * util)
            if o.pull_bytes:
                wire += o.pull_bytes / (k * NETWORK_BYTES_PER_S * UTIL_BATCHED_PULL)
        rpc = sum(o.pull_requests for o in self.ops) * RPC_OVERHEAD_S / k
        return wire + rpc

    @property
    def t_compute_s(self) -> float:
        k = max(1, self.k)
        t = self.measured_wall_s
        t += (self.push_bytes / BYTES_PER_VID) * SERIALIZE_S_PER_TUPLE_FIELD / k
        t += sum(o.sort_tuples for o in self.ops) * JOIN_SORT_S_PER_TUPLE / k
        for o in self.ops:  # buffered-join spill: write + read back (§4.3).
            # Only the *pushed* (barrier) hash join buffers shuffled
            # operands; a pulling hash join keeps partial results local.
            if op_spills(o, k):
                t += 2.0 * (o.buffer_bytes / k) / DISK_BYTES_PER_S
        accesses = sum(o.accesses for o in self.ops)
        if self.kv_model:
            t += accesses * KV_ACCESS_S / k
        else:
            t += accesses * PULL_CPU_S_PER_ACCESS / k
        return t

    @property
    def t_total_s(self) -> float:
        return self.t_compute_s + self.t_comm_s

    def table_row(self, work: str) -> dict:
        """One row shaped like the paper's Table 1."""
        return {
            "work": work,
            "T_s": round(self.t_total_s, 3),
            "T_R_s": round(self.t_compute_s, 3),
            "T_C_s": round(self.t_comm_s, 3),
            "C_MB": round(self.comm_bytes / 1e6, 3),
            "M_MB": round(self.peak_mem_bytes / 1e6, 3),
            "results": self.result_count,
        }
