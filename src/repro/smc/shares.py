"""Additive secret sharing over a prime field with fixed-point encoding.

Substrate for the paper's "lightweight SMC" option (protocol step 7): each
provider splits a real value into n uniformly random shares summing to the
value mod p; any n−1 shares are uniform and reveal nothing. Reconstruction
is the modular sum. Fixed-point encoding carries fractional estimates and
sensitivities with 2^-20 resolution.
"""
from __future__ import annotations

import numpy as np

#: Mersenne prime field modulus (fits comfortably in int64 arithmetic via
#: Python ints; numpy arrays use object-free uint64 staging).
FIELD_PRIME = (1 << 61) - 1

#: Fixed-point scaling: 20 fractional bits.
FIXED_POINT_SCALE = 1 << 20

#: Maximum representable magnitude (half the field, scaled down).
MAX_MAGNITUDE = (FIELD_PRIME // 2) / FIXED_POINT_SCALE


def encode(value: float) -> int:
    """Real -> field element (two's-complement style around the prime)."""
    if abs(value) > MAX_MAGNITUDE:
        raise OverflowError(f"|{value}| exceeds fixed-point range {MAX_MAGNITUDE}")
    return int(round(value * FIXED_POINT_SCALE)) % FIELD_PRIME


def decode(element: int) -> float:
    """Field element -> real (values above p/2 are negative)."""
    e = element % FIELD_PRIME
    if e > FIELD_PRIME // 2:
        e -= FIELD_PRIME
    return e / FIXED_POINT_SCALE


def share(value: float, n_parties: int, rng: np.random.Generator) -> list[int]:
    """Split ``value`` into ``n_parties`` additive shares."""
    if n_parties < 2:
        raise ValueError("secret sharing needs at least 2 parties")
    secret = encode(value)
    parts = [int(rng.integers(0, FIELD_PRIME)) for _ in range(n_parties - 1)]
    last = (secret - sum(parts)) % FIELD_PRIME
    return parts + [last]


def reconstruct(shares: list[int]) -> float:
    """Sum shares mod p and decode."""
    return decode(sum(int(s) for s in shares) % FIELD_PRIME)


def add_shares(a: list[int], b: list[int]) -> list[int]:
    """Pointwise share addition — secure sum without reconstruction."""
    if len(a) != len(b):
        raise ValueError("share vectors must have the same party count")
    return [(int(x) + int(y)) % FIELD_PRIME for x, y in zip(a, b)]
