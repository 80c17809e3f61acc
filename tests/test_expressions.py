"""Tests for derived range bounds over expressions (paper Appendix B)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.expressions import (
    box_min,
    concave_bounds,
    convex_bounds,
    monotone_bounds,
    vertex_max,
)


def test_paper_example():
    """AVG((2c1 + 3c2 - 1)^2), c1 in [-3,1], c2 in [-1,3] -> [0, 100]."""
    f = lambda c1, c2: (2 * c1 + 3 * c2 - 1) ** 2  # noqa: E731
    lo, hi = convex_bounds(f, [(-3, 1), (-1, 3)])
    assert hi == pytest.approx(100.0)
    assert lo == pytest.approx(0.0, abs=1e-3)


def test_monotone_increasing():
    f = lambda x, y: 2 * x + 3 * y  # noqa: E731
    lo, hi = monotone_bounds(f, [(0, 1), (0, 2)], increasing=[True, True])
    assert (lo, hi) == (0.0, 8.0)


def test_monotone_mixed_directions():
    f = lambda x, y: x - y  # noqa: E731
    lo, hi = monotone_bounds(f, [(0, 1), (0, 2)], increasing=[True, False])
    assert (lo, hi) == (-2.0, 1.0)


def test_monotone_flag_count_checked():
    with pytest.raises(ValueError):
        monotone_bounds(lambda x: x, [(0, 1)], increasing=[True, False])


def test_vertex_max_quadratic():
    f = lambda x, y: x * x + y * y  # noqa: E731
    assert vertex_max(f, [(-2, 1), (-1, 3)]) == pytest.approx(13.0)


def test_vertex_max_dimension_guard():
    with pytest.raises(ValueError):
        vertex_max(lambda *xs: 0.0, [(0, 1)] * 21)


@pytest.mark.parametrize(
    "box,expected",
    [([(-5, 5)], 0.0), ([(2, 5)], 4.0), ([(-5, -2)], 4.0)],
)
def test_box_min_quadratic_1d(box, expected):
    assert box_min(lambda x: x * x, box) == pytest.approx(expected, abs=1e-3)


def test_box_min_interior_minimum_2d():
    f = lambda x, y: (x - 0.3) ** 2 + (y + 0.4) ** 2 + 1.0  # noqa: E731
    assert box_min(f, [(-1, 1), (-1, 1)]) == pytest.approx(1.0, abs=1e-3)


def test_box_min_never_exceeds_best_corner():
    f = lambda x, y: np.sin(3 * x) + y * y  # noqa: E731  (non-convex)
    box = [(-2, 2), (-1, 1)]
    best_corner = min(f(x, y) for x in (-2, 2) for y in (-1, 1))
    assert box_min(f, box) <= best_corner + 1e-9


def test_concave_bounds():
    f = lambda x, y: -((x - 1) ** 2) - (y - 1) ** 2 + 10  # noqa: E731
    lo, hi = concave_bounds(f, [(0, 2), (0, 2)])
    assert hi == pytest.approx(10.0, abs=1e-3)  # interior max
    assert lo == pytest.approx(8.0, abs=1e-6)  # worst corner


def test_convex_bounds_enclose_samples():
    """Derived bounds must enclose f over any points in the box."""
    rng = np.random.default_rng(0)
    f = lambda x, y, z: (x + 2 * y - z) ** 2 + 0.5 * z * z  # noqa: E731
    box = [(-2, 3), (-1, 1), (0, 4)]
    lo, hi = convex_bounds(f, box)
    pts = [rng.uniform(a, b, 500) for a, b in box]
    vals = f(*pts)
    assert lo <= vals.min() + 1e-9
    assert hi >= vals.max() - 1e-9
