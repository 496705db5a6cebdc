"""MVmed-style key-frame extraction (§IV-A) as a Spark window job.

The paper selects key frames where compressed-domain motion vectors
change significantly (scene shifts / high activity) plus a temporal
fallback at fixed intervals. Our substrate generates the motion-vector
magnitude per frame; selection is a change-point rule over that signal:

    keyframe(f)  ⇔  |motion(f) − motion(f−1)| > threshold
                    ∨ frame_idx ≡ 0 (mod interval)

The first frame of each video (no predecessor) is always a key frame.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


def mark_keyframes(
    frames: DataFrame, *, threshold: float = 0.25, interval: int = 8
) -> DataFrame:
    """Add a boolean ``is_keyframe`` column to a frame-level DataFrame.

    ``frames`` must have ``video_id``, ``frame_idx`` and ``motion_mag``.
    """
    w = Window.partitionBy("video_id").orderBy("frame_idx")
    delta = F.abs(F.col("motion_mag") - F.lag("motion_mag").over(w))
    return frames.withColumn(
        "is_keyframe",
        F.coalesce(delta > F.lit(threshold), F.lit(True))
        | (F.col("frame_idx") % interval == 0),
    )


def select_keyframes(
    frames: DataFrame, *, threshold: float = 0.25, interval: int = 8
) -> DataFrame:
    """Key-frame identifiers only: ``(video_id, frame_idx)`` rows."""
    marked = mark_keyframes(frames, threshold=threshold, interval=interval)
    return marked.filter("is_keyframe").select("video_id", "frame_idx")
