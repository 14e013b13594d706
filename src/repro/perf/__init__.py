"""TMAM profiling substrate: cache/MLP simulator replacing Intel VTune.

The paper measures pipeline-slot breakdowns with VTune's top-down method
on a Skylake Xeon. That hardware counter path does not exist here, so we
simulate the part of the microarchitecture the paper's argument rests on:
a three-level cache + DRAM with bounded miss-level parallelism (MSHRs),
fed by the *actual* memory access streams of our engines. Dimensions are
scaled ~1/200 alongside the 1/1000-scale graphs so the graph-size : LLC
ratios of Table 5 are preserved.
"""
from repro.perf import amac, memsim, tmam, trace  # noqa: F401
