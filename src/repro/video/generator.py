"""Synthetic raw-video generation as a Spark DataFrame batch job.

A dataset is produced by fanning a ``spark.range(n_videos)`` out through
``applyInPandas``: each Spark task deterministically synthesises one
video's object tracks, per-frame motion-vector magnitudes (the MVmed
signal the key-frame extractor consumes) and the ViT patch grid.

The output is *raw* video truth — tags and exact bounding boxes — with
no embeddings: encoding is part of LOVO's (or a baseline's) processing
stage, so its cost is measured there, not here (Table III separates
"Processing" from "Search").

One patch row is emitted per grid cell per frame. A cell containing an
object's centre carries that object's track id, tags and true box; on
collision the larger object wins (occlusion). All other cells are
background. Boxes are ``[x1, y1, x2, y2]`` in normalised [0,1] frame
coordinates.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.video.scenes import SceneProfile

PATCH_SCHEMA = T.StructType(
    [
        T.StructField("patch_id", T.LongType()),
        T.StructField("video_id", T.IntegerType()),
        T.StructField("frame_idx", T.IntegerType()),
        T.StructField("patch_idx", T.IntegerType()),
        T.StructField("is_object", T.BooleanType()),
        T.StructField("track_id", T.LongType()),
        T.StructField("tags", T.ArrayType(T.StringType())),
        T.StructField("bbox", T.ArrayType(T.DoubleType())),
        T.StructField("motion_mag", T.DoubleType()),
    ]
)


def _track_assignments(prof: SceneProfile) -> list[tuple[int, tuple[str, ...], int, bool]]:
    """Flatten track specs to (video_id, tags, mean_len, small) rows.

    Tracks are dealt round-robin across videos so every video sees a
    representative population; deterministic in spec order.
    """
    out = []
    t = 0
    for spec in prof.track_specs:
        for _ in range(spec.n_tracks):
            out.append((t % prof.n_videos, spec.tags, spec.mean_len, spec.small))
            t += 1
    return out


def gen_video(prof: SceneProfile, video_id: int, seed: int = 0) -> pd.DataFrame:
    """Synthesise one video's patch rows (pure pandas; Spark-free, testable)."""
    rng = np.random.default_rng([seed, prof.seed, video_id])
    gh, gw = prof.grid
    k = gh * gw
    nf = prof.frames_per_video

    # --- tracks in this video -------------------------------------------
    placements: dict[int, list[tuple[int, tuple[str, ...], np.ndarray]]] = {
        f: [] for f in range(nf)
    }
    local = 0
    for vid, tags, mean_len, small in _track_assignments(prof):
        if vid != video_id:
            continue
        track_id = video_id * 100_000 + local
        local += 1
        length = max(3, int(rng.poisson(mean_len)))
        start = int(rng.integers(0, max(1, nf - length)))
        cx, cy = rng.uniform(0.15, 0.85, 2)
        vx, vy = rng.uniform(-0.01, 0.01, 2)
        if small or "attr:small" in tags:
            w, h = rng.uniform(0.05, 0.10, 2)
        else:
            w, h = rng.uniform(0.09, 0.22, 2)
        for t in range(length):
            f = start + t
            if f >= nf:
                break
            x = float(np.clip(cx + vx * t, 0.03, 0.97))
            y = float(np.clip(cy + vy * t, 0.03, 0.97))
            bbox = np.clip(
                np.array([x - w / 2, y - h / 2, x + w / 2, y + h / 2]), 0.0, 1.0
            )
            placements[f].append((track_id, tags, bbox))

    # --- motion-vector signal (MVmed substrate) -------------------------
    n_objs = np.array([len(placements[f]) for f in range(nf)], dtype=float)
    activity = np.abs(np.diff(n_objs, prepend=n_objs[0]))
    if prof.fixed_camera:
        base = 0.10 + 0.02 * rng.standard_normal(nf)
    else:  # moving camera: higher, auto-correlated ego-motion
        steps = 0.08 * rng.standard_normal(nf)
        base = 0.45 + np.cumsum(steps) * 0.2
        base = 0.45 + (base - base.mean())
    motion = np.abs(base + 0.30 * activity)

    # --- patch grid ------------------------------------------------------
    rows = []
    for f in range(nf):
        # object centre → grid cell; larger area wins a contested cell
        cell_owner: dict[int, tuple[int, tuple[str, ...], np.ndarray, float]] = {}
        for track_id, tags, bbox in placements[f]:
            cx = (bbox[0] + bbox[2]) / 2
            cy = (bbox[1] + bbox[3]) / 2
            col = min(gw - 1, int(cx * gw))
            row = min(gh - 1, int(cy * gh))
            cell = row * gw + col
            area = (bbox[2] - bbox[0]) * (bbox[3] - bbox[1])
            if cell not in cell_owner or area > cell_owner[cell][3]:
                cell_owner[cell] = (track_id, tags, bbox, area)
        frame_bg = prof.bg_tags[int(rng.integers(0, len(prof.bg_tags)))]
        for cell in range(k):
            pid = (np.int64(video_id) * nf + f) * k + cell
            if cell in cell_owner:
                track_id, tags, bbox, _ = cell_owner[cell]
                rows.append(
                    (int(pid), video_id, f, cell, True, int(track_id),
                     list(tags) + [frame_bg], [float(b) for b in bbox],
                     float(motion[f]))
                )
            else:
                row, col = divmod(cell, gw)
                cell_box = [col / gw, row / gh, (col + 1) / gw, (row + 1) / gh]
                rows.append(
                    (int(pid), video_id, f, cell, False, -1, [frame_bg],
                     cell_box, float(motion[f]))
                )
    return pd.DataFrame(
        rows,
        columns=[f.name for f in PATCH_SCHEMA.fields],
    )


def generate_dataset(
    spark: SparkSession, prof: SceneProfile, *, seed: int = 0
) -> DataFrame:
    """Generate the full dataset distributed: one Spark task per video."""

    def _gen(pdf: pd.DataFrame) -> pd.DataFrame:
        return gen_video(prof, int(pdf["video_id"].iloc[0]), seed)

    videos = spark.range(prof.n_videos).select(
        F.col("id").cast("int").alias("video_id")
    )
    return videos.groupBy("video_id").applyInPandas(_gen, schema=PATCH_SCHEMA)


def frames_df(patches: DataFrame) -> DataFrame:
    """Frame-level view: one row per (video, frame) with motion + object count."""
    return patches.groupBy("video_id", "frame_idx").agg(
        F.first("motion_mag").alias("motion_mag"),
        F.sum(F.col("is_object").cast("int")).alias("n_objects"),
    )
