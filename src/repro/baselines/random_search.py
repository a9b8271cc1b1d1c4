"""Random search (Bergstra & Bengio 2012) — the reference baseline.

Every speedup/cost-reduction metric in the paper's Figures 4–5 is
reported *relative to random search*, so this tuner doubles as the
normalizer in the HiBench experiments.
"""
from __future__ import annotations

from repro.baselines.base import Capabilities, Tuner


class RandomSearchTuner(Tuner):
    """Uniform random configuration at every iteration."""

    name = "Random"
    capabilities = Capabilities()

    def suggest(self) -> dict:
        return self.space.sample_random(1, self.rng)[0]
