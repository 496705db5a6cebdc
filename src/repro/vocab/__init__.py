"""Semantic-vocabulary substrate.

Simulates the embedding spaces of LOVO's decoupled encoders: every
semantic tag (object class, attribute, spatial relation) gets a seeded
random unit vector; objects and queries embed as normalised tag-vector
sums. Near-orthogonality of random high-dimensional vectors makes
cosine similarity track tag-set overlap, which is the property the
paper's aligned visual/text encoders provide.
"""
from repro.vocab.vocabulary import Vocabulary, MSCOCO_CLASSES, TagKind
from repro.vocab.encoders import (
    VisualEncoderSim,
    CoarseTextEncoder,
    FineTextEncoder,
    CostModel,
)

__all__ = [
    "Vocabulary",
    "MSCOCO_CLASSES",
    "TagKind",
    "VisualEncoderSim",
    "CoarseTextEncoder",
    "FineTextEncoder",
    "CostModel",
]
