"""Synthetic video-dataset substrate.

Replaces the paper's real video corpora (Cityscapes, Bellevue,
QVHighlights, Beach, ActivityNet-QA) with deterministic scene profiles
that emit videos → frames → object tracks → patch grids with simulated
visual embeddings and bounding boxes, generated as Spark DataFrame jobs.
Ground truth is exact by construction (tag-subset semantics).
"""
from repro.video.scenes import SceneProfile, TrackSpec, PROFILES, profile
from repro.video.generator import generate_dataset, PATCH_SCHEMA
from repro.video.keyframe import select_keyframes
from repro.video.groundtruth import gt_tracks, evaluate_ranking

__all__ = [
    "SceneProfile",
    "TrackSpec",
    "PROFILES",
    "profile",
    "generate_dataset",
    "PATCH_SCHEMA",
    "select_keyframes",
    "gt_tracks",
    "evaluate_ranking",
]
