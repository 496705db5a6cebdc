"""Tests for the synthetic video generator (pandas + Spark layers)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.video.generator import PATCH_SCHEMA, frames_df, gen_video, generate_dataset
from repro.video.scenes import profile


@pytest.fixture(scope="module")
def prof():
    return profile("bellevue", 0.1)


@pytest.fixture(scope="module")
def video0(prof):
    return gen_video(prof, 0, seed=0)


class TestGenVideo:
    def test_row_count(self, prof, video0):
        assert len(video0) == prof.frames_per_video * prof.patches_per_frame

    def test_columns_match_schema(self, video0):
        assert list(video0.columns) == [f.name for f in PATCH_SCHEMA.fields]

    def test_deterministic(self, prof):
        a = gen_video(prof, 0, seed=0)
        b = gen_video(prof, 0, seed=0)
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_content(self, prof):
        a = gen_video(prof, 0, seed=0)
        b = gen_video(prof, 0, seed=1)
        assert not a.equals(b)

    def test_patch_ids_unique(self, video0):
        assert video0["patch_id"].is_unique

    def test_one_patch_per_cell(self, prof, video0):
        counts = video0.groupby(["frame_idx", "patch_idx"]).size()
        assert (counts == 1).all()

    def test_bboxes_valid(self, video0):
        for b in video0["bbox"]:
            assert 0 <= b[0] <= b[2] <= 1 and 0 <= b[1] <= b[3] <= 1

    def test_objects_have_tracks_and_classes(self, video0):
        objs = video0[video0["is_object"]]
        assert (objs["track_id"] >= 0).all()
        assert objs["tags"].map(
            lambda ts: any(t.startswith("class:") for t in ts)
        ).all()

    def test_background_has_no_track(self, video0):
        bg = video0[~video0["is_object"]]
        assert (bg["track_id"] == -1).all()

    def test_every_row_has_bg_tag(self, video0):
        assert video0["tags"].map(
            lambda ts: any(t.startswith("bg:") for t in ts)
        ).all()

    def test_object_centre_inside_cell(self, prof, video0):
        gh, gw = prof.grid
        objs = video0[video0["is_object"]]
        for _, r in objs.iterrows():
            cx = (r["bbox"][0] + r["bbox"][2]) / 2
            cy = (r["bbox"][1] + r["bbox"][3]) / 2
            col = min(gw - 1, int(cx * gw))
            row = min(gh - 1, int(cy * gh))
            assert row * gw + col == r["patch_idx"]

    def test_motion_constant_within_frame(self, video0):
        assert (video0.groupby("frame_idx")["motion_mag"].nunique() == 1).all()

    def test_tracks_persist_over_frames(self, video0):
        objs = video0[video0["is_object"]]
        spans = objs.groupby("track_id")["frame_idx"].agg(["min", "max", "count"])
        assert (spans["count"] >= 2).any()  # multi-frame tracks exist

    def test_moving_camera_has_higher_motion(self):
        fixed = gen_video(profile("bellevue", 0.1), 0, seed=0)
        moving = gen_video(profile("cityscapes", 0.1), 0, seed=0)
        assert moving["motion_mag"].median() > fixed["motion_mag"].median()


class TestGenerateDataset:
    def test_total_rows(self, spark, prof):
        df = generate_dataset(spark, prof, seed=0)
        assert df.count() == prof.n_frames * prof.patches_per_frame

    def test_matches_pandas_layer(self, spark, prof):
        """The Spark fan-out must agree with direct per-video generation."""
        got = (
            generate_dataset(spark, prof, seed=0)
            .filter("video_id = 0")
            .toPandas()
            .sort_values("patch_id")
            .reset_index(drop=True)
        )
        want = gen_video(prof, 0, seed=0).sort_values("patch_id").reset_index(drop=True)
        assert len(got) == len(want)
        assert (got["patch_id"].to_numpy() == want["patch_id"].to_numpy()).all()
        assert (got["is_object"].to_numpy() == want["is_object"].to_numpy()).all()

    def test_frames_df_oracle(self, spark, prof):
        """Frame-level aggregation checked against DuckDB."""
        patches = generate_dataset(spark, prof, seed=0)
        flat = patches.select(
            "video_id", "frame_idx", "motion_mag", F.col("is_object").cast("int").alias("obj")
        )
        got = frames_df(patches).orderBy("video_id", "frame_idx")
        assert_equivalent(
            got,
            """
            SELECT video_id, frame_idx,
                   first(motion_mag) AS motion_mag,
                   sum(obj) AS n_objects
            FROM flat GROUP BY video_id, frame_idx
            """,
            flat=flat,
        )

    def test_all_videos_present(self, spark, prof):
        vids = {
            r["video_id"]
            for r in generate_dataset(spark, prof, seed=0)
            .select("video_id")
            .distinct()
            .collect()
        }
        assert vids == set(range(prof.n_videos))
