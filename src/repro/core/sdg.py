"""Stage Dependency Graph (§5.2, Table 4, Figure 3).

The SDG abstracts the Move operation of each sampling method into stages
(≤ 1 memory access per stage; jump-containing operations are their own
stage) connected by memory / computation / control dependencies. Stages
on control cycles ("cycle stages") are executed decoupled through the
search ring; non-cycle stages run coupled through the task ring (§5.3).

Besides documenting the design, the SDG drives the perf substrate: each
stage carries an instruction estimate and its memory-access kind, from
which the trace executor (:mod:`repro.perf.trace`) emits the address
stream and the AMAC comparison (Table 13) derives its state-keeping
overhead.
"""
from __future__ import annotations

from dataclasses import dataclass, field

MEMORY = "memory"
COMPUTATION = "computation"
CONTROL = "control"


@dataclass(frozen=True)
class Stage:
    """One SDG node: a set of operations with at most one memory access."""

    name: str
    ops: tuple  # human-readable operation list (Table 4 rows)
    mem: str | None = None  # what the single memory access loads, if any
    n_instr: int = 8  # instruction estimate for the perf model


@dataclass(frozen=True)
class Dep:
    """One SDG edge: src stage → dst stage with a dependency kind."""

    src: str
    dst: str
    kind: str  # MEMORY | COMPUTATION | CONTROL
    data: str = ""


@dataclass
class SDG:
    method: str
    stages: list[Stage] = field(default_factory=list)
    deps: list[Dep] = field(default_factory=list)

    def stage(self, name: str) -> Stage:
        return next(s for s in self.stages if s.name == name)

    def _adj(self, kinds: set[str]) -> dict[str, list[str]]:
        adj: dict[str, list[str]] = {s.name: [] for s in self.stages}
        for d in self.deps:
            if d.kind in kinds:
                adj[d.src].append(d.dst)
        return adj

    def _cyclic_nodes(self, kinds: set[str]) -> set[str]:
        """Nodes on at least one cycle in the subgraph of ``kinds`` edges."""
        adj = self._adj(kinds)
        on_cycle: set[str] = set()
        for start in adj:
            stack = [(start, iter(adj[start]))]
            seen = {start}
            while stack:
                node, it = stack[-1]
                found = False
                for nxt in it:
                    if nxt == start:
                        on_cycle.add(start)
                    if nxt not in seen:
                        seen.add(nxt)
                        stack.append((nxt, iter(adj[nxt])))
                        found = True
                        break
                if not found:
                    stack.pop()
        return on_cycle

    def cycle_stages(self) -> set[str]:
        """Stages on cycles (control edges included) — search-ring stages."""
        return self._cyclic_nodes({MEMORY, COMPUTATION, CONTROL})

    def data_dependency_is_dag(self) -> bool:
        """§5.2: considering only data dependencies, SDG must be a DAG."""
        return not self._cyclic_nodes({MEMORY, COMPUTATION})

    def validate(self) -> None:
        names = {s.name for s in self.stages}
        assert len(names) == len(self.stages), "duplicate stage names"
        for d in self.deps:
            assert d.src in names and d.dst in names, f"dangling dep {d}"
        assert self.data_dependency_is_dag()


def _alias_sdg() -> SDG:
    """Table 4, left column."""
    return SDG(
        method="alias",
        stages=[
            Stage("S0", ("O0: load d_v",), mem="d_v", n_instr=20),
            Stage("S1", ("O1: gen int x in [0,d_v)", "O2: gen real y in [0,1)",
                         "O3: load C[x]=(H[x],A[x])"), mem="C[x]", n_instr=80),
            Stage("S2", ("O4: pick A[x].first/second", "O5: add v' to Q"),
                  mem="E_v-path", n_instr=35),
        ],
        deps=[
            Dep("S0", "S1", MEMORY, "d_v"),
            Dep("S1", "S2", MEMORY, "(H[x],A[x])"),
            Dep("S1", "S2", COMPUTATION, "x,y"),
        ],
    )


def _rej_sdg() -> SDG:
    """Table 4, right column (+ Algorithm 5's S4)."""
    return SDG(
        method="rej",
        stages=[
            Stage("S0", ("O0: load d_v",), mem="d_v", n_instr=15),
            Stage("S1", ("O1: load p*_v",), mem="p*_v", n_instr=10),
            Stage("S2", ("O2: gen int x", "O3: gen real y in [0,p*)",
                         "O4: load C[x]=p"), mem="C[x]", n_instr=45),
            Stage("S3", ("O5: if y > C[x] jump to O2 else O6",), n_instr=8),
            Stage("S4", ("O6: load E_v[x]",), mem="E_v[x]", n_instr=15),
            Stage("S5", ("O7: add v' to Q",), n_instr=25),
        ],
        deps=[
            Dep("S0", "S2", MEMORY, "d_v"),
            Dep("S1", "S3", MEMORY, "p*_v"),
            Dep("S2", "S3", MEMORY, "C[x]"),
            Dep("S2", "S3", COMPUTATION, "x,y"),
            Dep("S3", "S2", CONTROL, "reject"),
            Dep("S3", "S4", CONTROL, "accept"),
            Dep("S2", "S4", COMPUTATION, "x"),
            Dep("S4", "S5", MEMORY, "E_v[x]"),
        ],
    )


def _naive_sdg() -> SDG:
    return SDG(
        method="naive",
        stages=[
            Stage("S0", ("load d_v",), mem="d_v", n_instr=20),
            Stage("S1", ("gen int x", "load E_v[x]"), mem="E_v[x]", n_instr=70),
            Stage("S2", ("add v' to Q",), n_instr=40),
        ],
        deps=[
            Dep("S0", "S1", MEMORY, "d_v"),
            Dep("S1", "S2", MEMORY, "E_v[x]"),
            Dep("S1", "S2", COMPUTATION, "x"),
        ],
    )


def _its_sdg() -> SDG:
    return SDG(
        method="its",
        stages=[
            Stage("S0", ("load d_v, total_v",), mem="d_v", n_instr=20),
            Stage("S1", ("gen real x in [0,total)",), n_instr=35),
            Stage("S2", ("load cum[mid]", "compare, narrow [lo,hi)"), mem="cum[mid]", n_instr=18),
            Stage("S3", ("load E_v[i]",), mem="E_v[i]", n_instr=15),
            Stage("S4", ("add v' to Q",), n_instr=25),
        ],
        deps=[
            Dep("S0", "S1", MEMORY, "d_v,total"),
            Dep("S1", "S2", COMPUTATION, "x"),
            Dep("S2", "S2", CONTROL, "binary-search iterate"),
            Dep("S2", "S3", CONTROL, "lo==hi"),
            Dep("S2", "S3", COMPUTATION, "i"),
            Dep("S3", "S4", MEMORY, "E_v[i]"),
        ],
    )


def _orej_sdg() -> SDG:
    return SDG(
        method="orej",
        stages=[
            Stage("S0", ("load d_v",), mem="d_v", n_instr=15),
            Stage("S1", ("gen int x", "gen real y in [0,p*)", "probe w(E_v[x])"),
                  mem="E_v[x] weight", n_instr=55),
            Stage("S2", ("if y > w jump to S1 else S3",), n_instr=8),
            Stage("S3", ("add v' to Q",), n_instr=25),
        ],
        deps=[
            Dep("S0", "S1", MEMORY, "d_v"),
            Dep("S1", "S2", MEMORY, "w"),
            Dep("S1", "S2", COMPUTATION, "x,y"),
            Dep("S2", "S1", CONTROL, "reject"),
            Dep("S2", "S3", CONTROL, "accept"),
        ],
    )


_BUILDERS = {
    "naive": _naive_sdg,
    "its": _its_sdg,
    "alias": _alias_sdg,
    "rej": _rej_sdg,
    "orej": _orej_sdg,
}


def sdg_for(method: str) -> SDG:
    """The Move-operation SDG for a sampling method (validated)."""
    g = _BUILDERS[method]()
    g.validate()
    return g
