"""Phase-by-phase plan execution in Spark (Step 9 of Figure 5).

Each phase applies its transfers as one Catalyst transformation: the
state DataFrame is left-joined against a small transfers table
(``src``, ``part`` → ``dst``), rows of a transferring (fragment,
partition) are re-assigned to the receiving fragment, and partial
aggregates are merged with a ``groupBy``. The per-transfer tuple counts
— measured with one aggregation job per phase on the cached state —
feed the ground-truth network cost model (``repro.netsim.truecost``),
so the simulated seconds reflect exactly what Spark actually moved.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.plan import Phase, Plan, Transfer
from repro.engine.state import DistState, finalize, merge_partials
from repro.netsim.topology import Topology
from repro.netsim.truecost import ComputeModel, phase_cost


@dataclass
class ExecutionResult:
    """Outcome of executing one plan.

    ``network_seconds`` is the simulated response time (Eq. 3: serial sum
    of phase costs, including receiver compute when a
    :class:`ComputeModel` is given). ``dest_tuples`` counts tuples
    received by final-destination fragments across all phases (Table 2).
    ``execution_wall_seconds`` is the real Spark wall time, reported for
    transparency but not part of the simulated metric.
    """

    final_df: DataFrame
    plan: Plan
    network_seconds: float
    phase_seconds: list[float] = field(default_factory=list)
    dest_tuples: int = 0
    total_tuples_sent: int = 0
    execution_wall_seconds: float = 0.0
    cached_df: DataFrame | None = None

    @property
    def response_seconds(self) -> float:
        """Simulated response time including coordinator planning time."""
        return self.network_seconds + self.plan.planning_seconds

    def unpersist(self) -> None:
        """Release the cached final state (call once done with final_df)."""
        if self.cached_df is not None:
            self.cached_df.unpersist()


def _collect_sizes(df: DataFrame) -> dict[tuple[int, int], int]:
    rows = df.groupBy("frag", "part").count().collect()
    return {(int(r["frag"]), int(r["part"])): int(r["count"]) for r in rows}


def _apply_phase(state: DistState, phase: Phase) -> DataFrame:
    """One phase as a join + merge transformation.

    The transfer table is control-plane metadata (a few dozen rows), so
    it carries an explicit broadcast hint; the data-path merge below it
    is still a full shuffle aggregation (the session keeps automatic
    broadcast joins disabled).
    """
    spark = state.df.sparkSession
    tdf = F.broadcast(
        spark.createDataFrame(
            [(t.src, t.part, t.dst) for t in phase],
            schema="t_src int, t_part int, t_dst int",
        )
    )
    df = state.df
    joined = df.join(
        tdf, (df["frag"] == tdf["t_src"]) & (df["part"] == tdf["t_part"]), "left"
    ).select(
        F.coalesce(tdf["t_dst"], df["frag"]).alias("frag"),
        df["part"],
        df["key"],
        *[df[p.name] for p in state.spec.partials],
    )
    return merge_partials(joined, state.spec)


def execute_plan(
    state: DistState,
    plan: Plan,
    topo: Topology,
    *,
    compute: ComputeModel | None = None,
) -> ExecutionResult:
    """Run ``plan`` over ``state``; return the finalized result and the
    simulated cost accounting.

    Raises if, after the last phase, any tuple sits away from its
    partition's destination — an incomplete plan is a bug, not a number.
    """
    if topo.n_frags != state.n_frags:
        raise ValueError(
            f"topology has {topo.n_frags} fragments, state has {state.n_frags}"
        )
    t0 = time.perf_counter()
    # localCheckpoint truncates lineage: without it, each phase's logical
    # plan nests the previous one and Catalyst analysis time grows
    # quadratically over a multi-phase plan.
    cur = state.df.localCheckpoint(eager=True)
    sizes = _collect_sizes(cur)
    w = state.tuple_bytes

    phase_secs: list[float] = []
    dest_tuples = 0
    total_sent = 0
    for phase in plan:
        bytes_sent: dict[Transfer, float] = {}
        for t in phase:
            n = sizes.get((t.src, t.part), 0)
            bytes_sent[t] = n * w
            total_sent += n
            if t.dst == state.dest[t.part]:
                dest_tuples += n
        phase_secs.append(
            phase_cost(
                phase,
                bytes_sent,
                topo,
                compute=compute,
                preaggregated=state.preaggregated,
            )
        )
        nxt = _apply_phase(state.with_df(cur), phase).localCheckpoint(eager=True)
        sizes = _collect_sizes(nxt)
        cur = nxt  # previous checkpoint blocks are reclaimed by the
        # context cleaner once unreferenced

    leftovers = sum(
        n for (frag, part), n in sizes.items() if frag != state.dest[part]
    )
    if leftovers:
        raise RuntimeError(
            f"plan {plan.algorithm!r} incomplete: {leftovers} tuples not at "
            "their destination after the last phase"
        )
    final_df = finalize(state.with_df(cur))
    return ExecutionResult(
        final_df=final_df,
        plan=plan,
        network_seconds=float(sum(phase_secs)),
        phase_seconds=phase_secs,
        dest_tuples=dest_tuples,
        total_tuples_sent=total_sent,
        execution_wall_seconds=time.perf_counter() - t0,
        cached_df=cur,
    )
