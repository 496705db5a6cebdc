"""Tests for MVmed-style key-frame extraction (window-function logic)."""
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.video.generator import frames_df
from repro.video.keyframe import mark_keyframes, select_keyframes


@pytest.fixture(scope="module")
def frames(spark, bellevue_patches):
    return frames_df(bellevue_patches).persist()


class TestMarkKeyframes:
    def test_oracle_equivalence(self, spark, frames):
        """The Spark window rule must match the same SQL in DuckDB."""
        got = mark_keyframes(frames, threshold=0.25, interval=8).select(
            "video_id", "frame_idx", "is_keyframe"
        )
        assert_equivalent(
            got,
            """
            SELECT video_id, frame_idx,
                   (coalesce(abs(motion_mag - lag(motion_mag) OVER
                        (PARTITION BY video_id ORDER BY frame_idx)) > 0.25, TRUE)
                    OR frame_idx % 8 = 0) AS is_keyframe
            FROM frames
            """,
            frames=frames.select("video_id", "frame_idx", "motion_mag"),
        )

    def test_first_frame_always_keyframe(self, frames):
        rows = (
            mark_keyframes(frames)
            .filter("frame_idx = 0")
            .select("is_keyframe")
            .collect()
        )
        assert rows and all(r["is_keyframe"] for r in rows)

    def test_interval_guarantee(self, frames):
        """Every interval-th frame is kept regardless of motion."""
        rows = (
            mark_keyframes(frames, threshold=9.9, interval=5)
            .filter("frame_idx % 5 = 0")
            .select("is_keyframe")
            .collect()
        )
        assert all(r["is_keyframe"] for r in rows)

    def test_threshold_monotone(self, frames):
        lo = mark_keyframes(frames, threshold=0.05, interval=1000).filter("is_keyframe").count()
        hi = mark_keyframes(frames, threshold=0.8, interval=1000).filter("is_keyframe").count()
        assert lo >= hi

    def test_infinite_threshold_keeps_only_interval(self, frames):
        kept = mark_keyframes(frames, threshold=1e9, interval=4).filter("is_keyframe")
        bad = kept.filter("frame_idx % 4 != 0").count()
        assert bad == 0


class TestSelectKeyframes:
    def test_subset_of_frames(self, frames):
        n_all = frames.count()
        n_kf = select_keyframes(frames).count()
        assert 0 < n_kf <= n_all

    def test_reduces_volume(self, frames):
        """With a sane threshold the selection actually prunes frames."""
        n_all = frames.count()
        n_kf = select_keyframes(frames, threshold=0.25, interval=8).count()
        assert n_kf < n_all

    def test_columns(self, frames):
        assert select_keyframes(frames).columns == ["video_id", "frame_idx"]

    def test_deterministic(self, frames):
        a = sorted(map(tuple, select_keyframes(frames).collect()))
        b = sorted(map(tuple, select_keyframes(frames).collect()))
        assert a == b
