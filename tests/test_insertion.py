"""Unit tests for the §5 partition-insertion policies."""
import pytest

from repro.frames import Frame
from repro.insertion import (
    AppendN,
    BestFit,
    FirstFit,
    FirstFitPct,
    NextFit,
    RandomPct,
    default_policies,
    make_policy,
)

CAP = 1000


def frames_with_free(*free_bytes):
    """Frames whose free space is exactly the given values (oldest first)."""
    out = []
    for free in free_bytes:
        f = Frame(CAP)
        if CAP - free > 0:
            f.insert(CAP - free)
        out.append(f)
    return out


ALL_NAMES = sorted(default_policies().keys())


@pytest.mark.parametrize("name", ALL_NAMES)
class TestCommonBehaviour:
    def test_empty_partition_returns_none(self, name):
        pol = make_policy(name)
        assert pol.find_frame([], 100) is None

    def test_returned_frame_fits(self, name):
        pol = make_policy(name)
        frames = frames_with_free(50, 300, 120, 800, 10)
        idx = pol.find_frame(frames, 100)
        if idx is not None:
            assert frames[idx].fits(100)

    def test_no_frame_fits_returns_none(self, name):
        pol = make_policy(name)
        frames = frames_with_free(50, 20, 90, 10)
        assert pol.find_frame(frames, 100) is None

    def test_search_counter_increments(self, name):
        pol = make_policy(name)
        frames = frames_with_free(10, 10, 10)
        pol.find_frame(frames, 100)
        assert pol.calls == 1
        assert pol.frames_searched >= 1

    def test_reset_stats(self, name):
        pol = make_policy(name)
        pol.find_frame(frames_with_free(500), 100)
        pol.reset_stats()
        assert pol.calls == 0
        assert pol.frames_searched == 0


class TestAppendN:
    def test_checks_only_last_n(self):
        pol = AppendN(2)
        # only frame 0 (oldest) has space; Append(2) must not see it
        frames = frames_with_free(900, 10, 10)
        assert pol.find_frame(frames, 100) is None
        assert pol.frames_searched == 2

    def test_finds_within_window(self):
        pol = AppendN(2)
        frames = frames_with_free(10, 500, 10)
        assert pol.find_frame(frames, 100) == 1

    def test_newest_first(self):
        pol = AppendN(8)
        frames = frames_with_free(500, 500, 500)
        assert pol.find_frame(frames, 100) == 2  # newest wins

    @pytest.mark.parametrize("n", [0, -3])
    def test_invalid_n(self, n):
        with pytest.raises(ValueError):
            AppendN(n)

    @pytest.mark.parametrize("n", [1, 2, 5, 8, 10])
    def test_search_bounded_by_n(self, n):
        pol = AppendN(n)
        frames = frames_with_free(*([0] * 20))
        pol.find_frame(frames, 100)
        assert pol.frames_searched == min(n, 20)


class TestFirstFit:
    def test_scans_all_until_fit(self):
        pol = FirstFit()
        frames = frames_with_free(800, 10, 10, 10)
        assert pol.find_frame(frames, 100) == 0
        assert pol.frames_searched == 4

    def test_stops_at_first_fit_from_newest(self):
        pol = FirstFit()
        frames = frames_with_free(800, 10, 500, 10)
        assert pol.find_frame(frames, 100) == 2
        assert pol.frames_searched == 2


class TestFirstFitPct:
    def test_limit_is_ceil_of_pct(self):
        pol = FirstFitPct(0.10)
        frames = frames_with_free(*([0] * 25))
        pol.find_frame(frames, 100)
        assert pol.frames_searched == 3  # ceil(0.1 * 25)

    def test_full_pct_equals_first_fit(self):
        frames = frames_with_free(800, 10, 10, 10)
        assert FirstFitPct(1.0).find_frame(frames, 100) == \
            FirstFit().find_frame(frames, 100)

    @pytest.mark.parametrize("p", [0.0, -0.1, 1.5])
    def test_invalid_pct(self, p):
        with pytest.raises(ValueError):
            FirstFitPct(p)


class TestBestFit:
    def test_picks_tightest(self):
        pol = BestFit()
        frames = frames_with_free(500, 120, 300, 101)
        assert pol.find_frame(frames, 100) == 3

    def test_exact_fit_short_circuits(self):
        pol = BestFit()
        frames = frames_with_free(500, 100, 300)
        assert pol.find_frame(frames, 100) == 1
        assert pol.frames_searched == 2  # newest-first scan stops at the exact fit

    def test_searches_everything_otherwise(self):
        pol = BestFit()
        frames = frames_with_free(500, 120, 300, 400)
        pol.find_frame(frames, 100)
        assert pol.frames_searched == 4


class TestNextFit:
    def test_first_record_from_newest(self):
        pol = NextFit()
        frames = frames_with_free(500, 500, 500)
        assert pol.find_frame(frames, 100) == 2

    def test_resumes_from_last_insertion(self):
        pol = NextFit()
        frames = frames_with_free(500, 500, 500)
        pol.notify_inserted(1, 200, appended=False)
        # smaller record → older frames first: starts at index 1
        idx = pol.find_frame(frames, 100)
        assert idx == 1

    def test_larger_record_goes_newer(self):
        pol = NextFit()
        frames = frames_with_free(900, 10, 900)
        pol.notify_inserted(1, 200, appended=False)
        # larger than last (200): search toward newer from index 1
        assert pol.find_frame(frames, 300) == 2

    def test_smaller_record_falls_back_to_newer(self):
        pol = NextFit()
        frames = frames_with_free(10, 10, 900)
        pol.notify_inserted(1, 200, appended=False)
        # smaller: older first (1, 0 fail), then newer (2 fits)
        assert pol.find_frame(frames, 100) == 2

    def test_notify_spilled_resets_state(self):
        pol = NextFit()
        pol.notify_inserted(5, 100, appended=False)
        pol.notify_spilled()
        frames = frames_with_free(500)
        assert pol.find_frame(frames, 100) == 0  # fresh newest-first search

    def test_stale_index_is_ignored(self):
        pol = NextFit()
        pol.notify_inserted(10, 100, appended=False)
        frames = frames_with_free(500, 500)
        assert pol.find_frame(frames, 100) in (0, 1)


class TestRandomPct:
    def test_deterministic_given_seed(self):
        frames = frames_with_free(500, 10, 500, 10, 500, 10, 500, 10, 500, 10)
        a = RandomPct(0.5, seed=42)
        b = RandomPct(0.5, seed=42)
        seq_a = [a.find_frame(frames, 100) for _ in range(20)]
        seq_b = [b.find_frame(frames, 100) for _ in range(20)]
        assert seq_a == seq_b

    def test_sample_size_bounded(self):
        pol = RandomPct(0.10, seed=1)
        frames = frames_with_free(*([0] * 30))
        pol.find_frame(frames, 100)
        assert pol.frames_searched == 3  # ceil(0.1 * 30)

    def test_single_frame_partition(self):
        pol = RandomPct(0.10, seed=1)
        frames = frames_with_free(500)
        assert pol.find_frame(frames, 100) == 0

    @pytest.mark.parametrize("p", [0.0, 1.01])
    def test_invalid_pct(self, p):
        with pytest.raises(ValueError):
            RandomPct(p)


class TestRegistry:
    def test_default_policies_complete(self):
        assert set(default_policies()) == {
            "append(8)", "first-fit", "first-fit(10%)", "best-fit",
            "next-fit", "random(10%)"}

    def test_make_policy_unknown_raises(self):
        with pytest.raises(KeyError):
            make_policy("worst-fit")

    @pytest.mark.parametrize("name", ALL_NAMES)
    def test_make_policy_returns_fresh_instances(self, name):
        assert make_policy(name) is not make_policy(name)
