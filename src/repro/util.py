"""Small shared helpers: deterministic seeding and entropy."""
import numpy as np


def trial_rng(base_seed: int, *fields) -> np.random.Generator:
    """Independent, reproducible PRNG for one trial.

    ``fields`` identify the trial (algorithm index, sample number, k, trial
    number, ...); SeedSequence mixes them so streams are independent across
    trials and runs with the same base seed are reproducible (§4.1's
    "different seed values per algorithm run").
    """
    ints = [base_seed] + [int(f) for f in fields]
    return np.random.default_rng(np.random.SeedSequence(ints))


def entropy_bits(counts) -> float:
    """Shannon entropy H = −Σ p log₂ p of an empirical distribution."""
    c = np.asarray(counts, dtype=np.float64)
    c = c[c > 0]
    if len(c) == 0:
        return 0.0
    p = c / c.sum()
    return float(-(p * np.log2(p)).sum())
