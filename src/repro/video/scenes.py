"""Per-dataset scene profiles.

Each profile mirrors one of the paper's datasets (§VII-A) in the
properties LOVO is sensitive to: corpus size, fixed vs. moving camera
(motion-vector statistics drive key-frame extraction), object/attribute
population, and — crucially for reproducing the AveP tables — how many
tracks exactly match each workload query vs. how many near-miss
distractors share its class or a subset of its attributes.

Distractor tiers per query:
  * ``class-only``   — same head class, none of the queried attributes;
  * ``half-attrs``   — class + roughly half the queried attributes;
  * ``no-relations`` — class + all attributes but missing the relation
    tags (these are what the coarse fast-search stage cannot tell apart
    and the cross-modality rerank must demote — Table IV's Q2.2 shape).
"""
from __future__ import annotations

from dataclasses import dataclass, replace

from repro.queries.workload import Query, queries_for_dataset


@dataclass(frozen=True)
class TrackSpec:
    """A population of object tracks sharing one tag set."""

    tags: tuple[str, ...]
    n_tracks: int
    mean_len: int = 12  # frames a track persists (visibility run)
    small: bool = False  # smaller boxes (harder IoU for frame-level methods)


@dataclass(frozen=True)
class SceneProfile:
    """One synthetic dataset: sizing, camera model and track population."""

    name: str
    n_videos: int
    frames_per_video: int
    grid: tuple[int, int]  # (rows, cols) of the ViT patch grid
    fixed_camera: bool
    bg_tags: tuple[str, ...]
    track_specs: tuple[TrackSpec, ...]
    daily_life: bool = False  # matches VISA/UMT training-domain bias (§VII-B)
    seed: int = 0

    @property
    def patches_per_frame(self) -> int:
        return self.grid[0] * self.grid[1]

    @property
    def n_frames(self) -> int:
        return self.n_videos * self.frames_per_video

    def scaled(self, sf: float) -> "SceneProfile":
        """Shrink/grow the profile for tests (sf<1) or stress runs (sf>1).

        Scales frames-per-video and every track population, keeping at
        least one video / 20 frames / 1 track so ground truth never
        vanishes.
        """
        if sf == 1.0:
            return self
        r = sf ** 0.5  # split the scale between corpus width and depth
        return replace(
            self,
            n_videos=max(1, round(self.n_videos * r)),
            frames_per_video=max(20, round(self.frames_per_video * r)),
            track_specs=tuple(
                replace(s, n_tracks=max(1, round(s.n_tracks * r)))
                for s in self.track_specs
            ),
        )


def _query_population(q: Query, *, n_exact: int, n_class: int, n_half: int,
                      n_norel: int, small: bool = False) -> list[TrackSpec]:
    """Exact matches + graded distractors for one workload query."""
    specs = [TrackSpec(q.tags, n_exact, small=small)]
    cls = q.class_tags
    attrs = q.attr_tags
    rels = q.rel_tags
    if n_class:
        specs.append(TrackSpec(cls, n_class, small=small))
    if n_half and attrs:
        half = attrs[: max(1, len(attrs) // 2)]
        specs.append(TrackSpec(cls + half, n_half, small=small))
    if n_norel and rels:
        # all attributes, no relations — only the reranker can demote these
        specs.append(TrackSpec(cls + attrs, n_norel, small=small))
    return specs


def _dedup(specs: list[TrackSpec]) -> tuple[TrackSpec, ...]:
    """Merge specs with identical tag sets (populations add up)."""
    merged: dict[tuple[str, ...], TrackSpec] = {}
    for s in specs:
        key = tuple(sorted(s.tags))
        if key in merged:
            old = merged[key]
            merged[key] = replace(old, n_tracks=old.n_tracks + s.n_tracks)
        else:
            merged[key] = s
    return tuple(merged.values())


def _build_profile(name: str, *, n_videos: int, frames_per_video: int,
                   grid: tuple[int, int], fixed_camera: bool,
                   bg_tags: tuple[str, ...], generic: list[TrackSpec],
                   daily_life: bool = False, seed: int = 0,
                   hard: frozenset[str] = frozenset()) -> SceneProfile:
    specs: list[TrackSpec] = list(generic)
    for q in queries_for_dataset(name):
        harder = q.qid in hard
        specs += _query_population(
            q,
            n_exact=5 if harder else 6,
            n_class=18 if harder else 12,
            n_half=8 if harder else 5,
            n_norel=7 if harder else 4,
            small=q.dataset in ("cityscapes", "bellevue"),
        )
    return SceneProfile(
        name=name, n_videos=n_videos, frames_per_video=frames_per_video,
        grid=grid, fixed_camera=fixed_camera, bg_tags=bg_tags,
        track_specs=_dedup(specs), daily_life=daily_life, seed=seed,
    )


#: Generic (non-query) traffic/street population shared by road datasets.
_ROAD_GENERIC = [
    TrackSpec(("class:car", "attr:blue"), 12),
    TrackSpec(("class:car", "attr:black", "attr:large"), 10),
    TrackSpec(("class:car", "attr:white"), 12),
    TrackSpec(("class:suv", "attr:black"), 8),  # unseen class for QA-index
    TrackSpec(("class:motorcycle",), 6),
    TrackSpec(("class:traffic_light",), 4),
]

PROFILES: dict[str, SceneProfile] = {
    "cityscapes": _build_profile(
        "cityscapes", n_videos=6, frames_per_video=200, grid=(6, 6),
        fixed_camera=False,
        bg_tags=("bg:street", "bg:building", "bg:sidewalk"),
        generic=_ROAD_GENERIC + [TrackSpec(("class:person", "attr:standing"), 10)],
        seed=11, hard=frozenset({"Q1.4"}),
    ),
    "bellevue": _build_profile(
        "bellevue", n_videos=6, frames_per_video=200, grid=(6, 6),
        fixed_camera=True,
        bg_tags=("bg:road", "bg:intersection", "bg:crosswalk"),
        generic=_ROAD_GENERIC,
        seed=22, hard=frozenset({"Q2.1", "Q2.2"}),
    ),
    "qvhighlights": _build_profile(
        "qvhighlights", n_videos=8, frames_per_video=150, grid=(6, 6),
        fixed_camera=False,
        bg_tags=("bg:indoor", "bg:car_interior", "bg:outdoor"),
        generic=[
            TrackSpec(("class:woman", "attr:black_clothes"), 10),
            TrackSpec(("class:person", "attr:talking"), 12),
            TrackSpec(("class:dog", "attr:brown"), 8),
            TrackSpec(("class:car", "attr:white"), 6),
        ],
        daily_life=True, seed=33,
    ),
    "beach": _build_profile(
        "beach", n_videos=4, frames_per_video=300, grid=(6, 6),
        fixed_camera=True,
        bg_tags=("bg:road", "bg:beach", "bg:sidewalk"),
        generic=[
            TrackSpec(("class:bus", "attr:white"), 10),  # FiGO's confusion (Fig. 7)
            TrackSpec(("class:car", "attr:white"), 10),
            TrackSpec(("class:person", "attr:walking"), 12),
            TrackSpec(("class:truck", "attr:large", "attr:blue"), 8),
        ],
        seed=44, hard=frozenset({"Q4.2"}),
    ),
    "activitynet": _build_profile(
        "activitynet", n_videos=12, frames_per_video=80, grid=(6, 6),
        fixed_camera=False,
        bg_tags=("bg:indoor", "bg:outdoor", "bg:meadow"),
        generic=[
            TrackSpec(("class:person", "attr:talking"), 14),
            TrackSpec(("class:person", "attr:hat",), 8),
            TrackSpec(("class:car", "attr:parked"), 8),
            TrackSpec(("class:dog",), 6),
        ],
        daily_life=True, seed=55,
    ),
}


def profile(name: str, sf: float = 1.0) -> SceneProfile:
    """Fetch a profile, optionally scaled (``sf<1`` shrinks it for tests)."""
    return PROFILES[name].scaled(sf)
