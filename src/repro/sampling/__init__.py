"""The five sampling methods of §2.3 (NAIVE, ITS, ALIAS, REJ, O-REJ).

Each method module exposes the two phases the paper separates:

* ``init(weights)`` — the initialization phase over one vertex's transition
  probabilities (used per-step for dynamic RW, and by the whole-graph
  preprocessing of Algorithm 3 in :mod:`repro.sampling.preprocess`);
* generation — both a scalar form (used by the sequential / BSP / ASP
  engines) and a vectorized batch form over a ring of walkers (used by the
  step-interleaving engine). Both forms consume the counter RNG with the
  same (qid, step, draw) indices, so they select identical edges.
"""
from repro.sampling import alias, base, its, naive, orej, preprocess, rej  # noqa: F401

METHODS = ("naive", "its", "alias", "rej", "orej")
