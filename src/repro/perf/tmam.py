"""Top-down pipeline-slot breakdown (TMAM) from simulator counters.

Maps :class:`repro.perf.memsim.SimStats` onto the five TMAM categories
the paper reports (front-end, bad speculation, core bound, memory bound,
retiring) plus DRAM bandwidth and per-step instruction/cycle counts.

Attribution model:
* *retiring* — issued useful uops over total slots (width × cycles);
* *bad speculation* — cycles lost to mispredicted branches (rejection
  retries, search iterations) over cycles;
* *memory bound* — cycles the core spent with every in-flight lane
  waiting on memory (plus MSHR-full waits);
* *front-end* — small fixed share (the simulator has no fetch model);
* *core bound* — the remainder (switch overhead lands here).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.perf.memsim import SimConfig, SimStats

_FRONT_END = 0.02


@dataclass
class Breakdown:
    front_end: float
    bad_spec: float
    core: float
    memory: float
    retiring: float
    bandwidth_gbs: float
    cycles_per_step: float
    instructions_per_step: float
    ipc: float

    def as_row(self) -> dict:
        return {
            "front_end": round(self.front_end, 3),
            "bad_spec": round(self.bad_spec, 3),
            "core": round(self.core, 3),
            "memory": round(self.memory, 3),
            "retiring": round(self.retiring, 3),
            "bandwidth_gbs": round(self.bandwidth_gbs, 2),
            "cycles_per_step": round(self.cycles_per_step, 1),
            "instr_per_step": round(self.instructions_per_step, 1),
            "ipc": round(self.ipc, 2),
        }


def breakdown(stats: SimStats, cfg: SimConfig | None = None) -> Breakdown:
    cfg = cfg or SimConfig()
    cycles = max(1e-9, stats.cycles)
    slots = cfg.issue_width * cycles
    retiring = min(1.0, stats.instructions / slots)
    memory = min(1.0, stats.stall_cycles / cycles)
    bad_spec = min(1.0, stats.branch_events * cfg.mispredict_cost / cycles)
    front_end = _FRONT_END
    core = max(0.0, 1.0 - retiring - memory - bad_spec - front_end)
    n = max(1, stats.n_steps)
    return Breakdown(
        front_end=front_end,
        bad_spec=bad_spec,
        core=core,
        memory=memory,
        retiring=retiring,
        bandwidth_gbs=stats.bandwidth_gbs(cfg),
        cycles_per_step=cycles / n,
        instructions_per_step=stats.instructions / n,
        ipc=stats.instructions / cycles,
    )
