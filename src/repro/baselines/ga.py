"""Genetic-algorithm search over a performance model.

RFHOC and DAC both couple a learned performance model with a genetic
algorithm that searches the configuration space against the model's
predictions. This is a standard real-coded GA in the unit cube:
tournament selection, uniform crossover, Gaussian mutation, elitism.
"""
from __future__ import annotations

from collections.abc import Callable

import numpy as np

from repro.core.config_space import ConfigSpace


def ga_minimize(
    space: ConfigSpace,
    fitness: Callable[[np.ndarray], np.ndarray],
    *,
    rng: np.random.Generator,
    pop_size: int = 40,
    generations: int = 25,
    mutation_sigma: float = 0.15,
    crossover_rate: float = 0.7,
) -> dict:
    """Minimize ``fitness`` (batch: (n, d) unit matrix → (n,) scores)."""
    d = space.dim
    pop = rng.random((pop_size, d))
    scores = fitness(pop)
    for _ in range(generations):
        children = np.empty_like(pop)
        for i in range(pop_size):
            # binary tournament ×2 for the two parents
            a, b = rng.integers(pop_size, size=2)
            p1 = pop[a] if scores[a] < scores[b] else pop[b]
            a, b = rng.integers(pop_size, size=2)
            p2 = pop[a] if scores[a] < scores[b] else pop[b]
            mask = rng.random(d) < crossover_rate
            child = np.where(mask, p1, p2)
            mut = rng.random(d) < 0.2
            child = np.where(
                mut, np.clip(child + rng.normal(0, mutation_sigma, d), 0, 1), child
            )
            children[i] = child
        child_scores = fitness(children)
        # elitist merge: keep the best pop_size of parents ∪ children
        allpop = np.vstack([pop, children])
        allsc = np.concatenate([scores, child_scores])
        keep = np.argsort(allsc, kind="stable")[:pop_size]
        pop, scores = allpop[keep], allsc[keep]
    return space.from_unit(pop[0])
