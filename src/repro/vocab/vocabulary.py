"""Tag registry and seeded tag→vector embedding.

Each tag string deterministically maps to a unit vector in R^dim via a
per-tag RNG seeded from ``(global_seed, crc32(tag))``. Two vocabularies
built with the same ``(dim, seed)`` agree exactly, so driver and Spark
workers can rebuild the same embedding space without shipping arrays.

Tag naming convention (used by scenes/workload/ground truth):
  ``class:person`` — object class (open vocabulary)
  ``attr:red``     — attribute (colour, clothing, size, state, ...)
  ``rel:center_of_road`` — spatial/behavioural relation
  ``bg:road``      — background/scene context
"""
from __future__ import annotations

import zlib
from enum import Enum

import numpy as np


class TagKind(str, Enum):
    """Kinds of semantic tags; drives what each encoder can see."""

    CLASS = "class"
    ATTR = "attr"
    REL = "rel"
    BG = "bg"


#: Predefined detector label set (MSCOCO-ish). QA-index baselines can only
#: answer queries whose head class is in this set (§II, Table I).
MSCOCO_CLASSES: tuple[str, ...] = (
    "person",
    "car",
    "bus",
    "truck",
    "bicycle",
    "dog",
    "motorcycle",
    "boat",
    "traffic_light",
    "woman",  # treated as `person` subclass by detectors; listed for parsing
)


def tag_kind(tag: str) -> TagKind:
    """Return the :class:`TagKind` encoded in a tag's ``kind:`` prefix."""
    prefix = tag.split(":", 1)[0]
    return TagKind(prefix)


def tag_name(tag: str) -> str:
    """Return the bare name of a tag (``class:person`` → ``person``)."""
    return tag.split(":", 1)[1]


class Vocabulary:
    """Deterministic tag→unit-vector embedding space.

    Parameters
    ----------
    dim:
        Embedding dimensionality D' (the paper's reduced class-embedding
        dimension, §IV-C).
    seed:
        Global seed; combined with a per-tag CRC so every tag has an
        independent, reproducible direction.
    """

    def __init__(self, dim: int = 64, seed: int = 7):
        if dim < 8:
            raise ValueError(f"dim must be >= 8, got {dim}")
        self.dim = int(dim)
        self.seed = int(seed)
        self._cache: dict[str, np.ndarray] = {}

    def vec(self, tag: str) -> np.ndarray:
        """Unit vector for ``tag`` (cached, deterministic)."""
        v = self._cache.get(tag)
        if v is None:
            rng = np.random.default_rng(
                (self.seed * 0x9E3779B1 + zlib.crc32(tag.encode())) % (2**63)
            )
            v = rng.standard_normal(self.dim)
            v /= np.linalg.norm(v)
            self._cache[tag] = v
        return v

    def embed_tags(
        self, tags: list[str] | tuple[str, ...], weights: dict[str, float] | None = None
    ) -> np.ndarray:
        """L2-normalised weighted sum of tag vectors.

        Class tags get weight 2.0 by default (the head noun dominates an
        object's appearance), others 1.0; ``weights`` overrides per tag.
        Returns the zero vector for an empty tag list.
        """
        if not tags:
            return np.zeros(self.dim)
        acc = np.zeros(self.dim)
        for t in tags:
            w = (weights or {}).get(t, 2.0 if tag_kind(t) == TagKind.CLASS else 1.0)
            acc += w * self.vec(t)
        n = np.linalg.norm(acc)
        return acc / n if n > 0 else acc

    def token_matrix(self, tags: list[str] | tuple[str, ...]) -> np.ndarray:
        """Stack of per-tag unit vectors, shape ``(len(tags), dim)``.

        Used as token-level features by the cross-modality reranker.
        Returns an empty ``(0, dim)`` array for no tags.
        """
        if not tags:
            return np.zeros((0, self.dim))
        return np.stack([self.vec(t) for t in tags])
