"""Synthetic word-embedding model (the paper uses fastText; see DESIGN.md).

E-relatedness needs one property from the WEM: tokens that belong to the
same semantic domain must have high-cosine vectors, so that two attributes
whose *frequent* tokens come from the same domain (e.g. street suffixes,
practice-type words) end up E-related even when their value sets barely
overlap. A pre-trained fastText model is unavailable offline, so we build a
WEM with exactly that property:

* each semantic domain d gets a random unit *centroid* c_d;
* an in-vocabulary token t gets ``normalize(alpha * c_d + (1-alpha) * n_t)``
  where ``n_t`` is token-specific deterministic noise;
* an out-of-vocabulary token gets pure noise (fastText would still emit a
  vector via char n-grams; pure noise preserves "OOV tokens carry no shared
  signal", which is the behaviour the pipeline depends on).

Vectors are deterministic in (token, seed), so index and query time agree.
"""
from __future__ import annotations

import numpy as np

from repro.core.hashing import stable_hash64
from repro.lake import vocab

DEFAULT_DIM = 50
_ALPHA = 0.82  # domain-centroid share; keeps same-domain cosine ~= _ALPHA^2 > 0.6


class WordEmbeddingModel:
    """Deterministic domain-clustered token vectors (fastText stand-in)."""

    def __init__(
        self,
        domains: dict[str, list[str]] | None = None,
        *,
        dim: int = DEFAULT_DIM,
        seed: int = 13,
        alpha: float = _ALPHA,
    ) -> None:
        self.dim = dim
        self.seed = seed
        self.alpha = alpha
        domains = vocab.DOMAINS if domains is None else domains
        rng = np.random.default_rng(seed)
        self._centroids: dict[str, np.ndarray] = {}
        self._token_domain: dict[str, str] = {}
        for name in sorted(domains):
            c = rng.standard_normal(dim)
            self._centroids[name] = c / np.linalg.norm(c)
            for token in domains[name]:
                # First domain to claim a token wins (sorted order => stable).
                self._token_domain.setdefault(token.lower(), name)

    # -- token level --------------------------------------------------------

    def domain_of(self, token: str) -> str | None:
        """The semantic domain of ``token``, or None if out-of-vocabulary."""
        return self._token_domain.get(token.lower())

    def _noise(self, token: str) -> np.ndarray:
        rng = np.random.default_rng(stable_hash64(f"{self.seed}::{token.lower()}"))
        n = rng.standard_normal(self.dim)
        return n / np.linalg.norm(n)

    def vector(self, token: str) -> np.ndarray:
        """Unit-norm embedding of one token."""
        noise = self._noise(token)
        domain = self.domain_of(token)
        if domain is None:
            return noise
        v = self.alpha * self._centroids[domain] + (1.0 - self.alpha) * noise
        return v / np.linalg.norm(v)

    # -- attribute level -----------------------------------------------------

    def aggregate(self, tokens) -> np.ndarray:
        """Mean of token vectors (zero vector for an empty token set).

        The paper collects the set of frequent-token vectors per attribute
        and compares attributes by cosine; comparing the means is the
        standard single-vector reduction and preserves the domain signal.
        """
        toks = list(tokens)
        if not toks:
            return np.zeros(self.dim)
        return np.mean([self.vector(t) for t in toks], axis=0)
