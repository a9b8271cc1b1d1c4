"""CherryPick (Alipourfard et al., NSDI 2017).

Bayesian optimization that minimizes execution cost subject to a
runtime threshold — EI weighted by the probability of meeting the
constraint. CherryPick needs no offline runs (NOER ✓) and partially
supports constraints (Table 1: Constr. △) but never reduces the search
space, has no safe region, and uses no meta-knowledge — so, as §6.3
notes, "it cannot handle the large Spark search space well".
"""
from __future__ import annotations

import numpy as np

from repro.baselines.base import NO, PARTIAL, YES, Capabilities, Tuner
from repro.core.acquisition import eic
from repro.core.gp import GaussianProcess


class CherryPickTuner(Tuner):
    """Full-space BO with constrained EI; Sobol initial design."""

    name = "CherryPick"
    capabilities = Capabilities(constraints=PARTIAL, noer=YES)
    n_init = 3
    n_candidates = 1000

    def suggest(self) -> dict:
        it = len(self.history)
        if it < self.n_init:
            return self.space.sample_sobol(self.n_init, seed=self.seed)[it]
        X = self.history.X_unit()
        gp_f = GaussianProcess(self.space.cat_mask).fit(
            X, self.history.penalized_objectives()
        )
        gp_t = GaussianProcess(self.space.cat_mask).fit(
            X, np.log(np.maximum(self.history.runtimes(), 1e-9))
        )
        cands = self.space.sample_random(self.n_candidates, self.rng)
        U = np.array([self.space.to_unit(c) for c in cands])
        mu_f, sd_f = gp_f.predict(U)
        posteriors = []
        for c in self.problem.constraints:
            if c.metric == "runtime":
                mu_t, sd_t = gp_t.predict(U)
                posteriors.append((mu_t, sd_t, np.log(max(c.threshold, 1e-9))))
        best = self.history.best()
        y_best = best.objective if best else float(np.min(self.history.objectives()))
        acq = eic(mu_f, sd_f, y_best, posteriors)
        return cands[int(np.argmax(acq))]
