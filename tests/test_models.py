"""Table I function families: transforms, fitting, evaluation."""
import math

import numpy as np
import pytest

from repro.core.models import (
    FAMILIES, DEFAULT_FAMILIES, CubicOdd, Exponential, FragmentFitter, Linear,
    Logarithmic, Power, Quadratic2, Quadratic3, Radical, family_by_kind,
    fit_fragment,
)

RNG = np.random.default_rng(0)


def _sample_from(family, n, rng):
    """Generate data exactly on a function of the family (positive values)."""
    xs = np.arange(1, n + 1, dtype=np.float64)
    if isinstance(family, Linear):
        return 3.0 * xs + 500.0
    if isinstance(family, Radical):
        return 40.0 * np.sqrt(xs) + 500.0
    if isinstance(family, Quadratic2):
        return 0.5 * xs * xs + 500.0
    if isinstance(family, Quadratic3):
        return 0.3 * xs * xs - 2.0 * xs + 700.0
    if isinstance(family, Exponential):
        return 500.0 * np.exp(0.01 * xs)
    if isinstance(family, Power):
        return 500.0 * np.power(xs, 0.4)
    if isinstance(family, Logarithmic):
        return 30.0 * np.log(xs) + 500.0
    if isinstance(family, CubicOdd):
        return 0.01 * xs**3 + 2.0 * xs + 0.0
    raise AssertionError(family)


class TestTableIFamilies:
    @pytest.mark.parametrize("family", FAMILIES, ids=lambda f: f.kind)
    @pytest.mark.parametrize("eps", [2, 8, 64])
    def test_fit_covers_exact_data_plus_noise(self, family, eps):
        """Data generated from the family + noise <= eps admits one fragment."""
        rng = np.random.default_rng(hash((family.kind, eps)) % 2**32)
        n = 200
        ys = _sample_from(family, n, rng)
        noise = rng.integers(-eps, eps + 1, n)
        data = np.round(ys).astype(np.int64) + noise
        data = np.maximum(data, eps + 1)  # positivity for log-domain families
        # fitting with 2*eps+1 slack: rounding + noise stay within the bound
        params = fit_fragment(family, 2 * eps + 1, data)
        assert params is not None, f"{family.kind} failed to cover its own data"
        approx = family.evaluate(params, np.arange(1, n + 1, dtype=np.float64))
        assert np.max(np.abs(approx - data)) <= 2 * eps + 1 + 1e-6

    @pytest.mark.parametrize("family", FAMILIES, ids=lambda f: f.kind)
    def test_evaluate1_matches_vectorised(self, family):
        rng = np.random.default_rng(7)
        data = np.round(_sample_from(family, 50, rng)).astype(np.int64)
        params = fit_fragment(family, 10, data)
        if params is None:
            pytest.skip("family cannot cover its rounded sample at eps=10")
        xs = np.arange(1, 51, dtype=np.float64)
        vec = family.evaluate(params, xs)
        for x, v in zip(xs, vec):
            assert family.evaluate1(params, float(x)) == pytest.approx(float(v), rel=1e-12, abs=1e-9)

    @pytest.mark.parametrize("family", FAMILIES, ids=lambda f: f.kind)
    def test_t_is_increasing_in_x(self, family):
        """Theorem 1 assumption (3): t_k positive increasing in x_k."""
        ts = []
        y = 1000
        for x in range(1, 50):
            c = family.constraint(x, y, 1, 1, y)
            if c is None:
                continue
            ts.append(c[0])
        assert all(b > a for a, b in zip(ts, ts[1:]))

    @pytest.mark.parametrize("family", FAMILIES, ids=lambda f: f.kind)
    def test_constraint_brackets_value(self, family):
        """alpha_k <= (value transform) <= omega_k must hold for eps > 0."""
        y = 500
        for x in [1, 2, 10]:
            c = family.constraint(x, y, 4, 1, 480)
            if c is None:
                continue
            t, lo, hi = c
            assert lo <= hi
            assert math.isfinite(t) and math.isfinite(lo) and math.isfinite(hi)


class TestPositivity:
    def test_exponential_raises_on_nonpositive(self):
        with pytest.raises(ValueError):
            Exponential().constraint(1, 0, 1, 1, 0)

    def test_power_raises_on_nonpositive(self):
        with pytest.raises(ValueError):
            Power().constraint(1, 1, 2, 1, 1)

    def test_requires_positive_flags(self):
        assert Exponential().requires_positive
        assert Power().requires_positive
        assert not Linear().requires_positive


class TestFragmentFitter:
    def test_single_point_all_families(self):
        for fam in FAMILIES:
            f = FragmentFitter(fam, 1)
            assert f.try_extend(100)
            assert len(f) == 1
            params = f.params()
            v = fam.evaluate1(params, 1.0)
            if fam.anchored:
                assert v == pytest.approx(100.0)

    def test_empty_params_raises(self):
        with pytest.raises(ValueError):
            FragmentFitter(Linear(), 1).params()

    def test_eps_zero_exact_linear(self):
        f = FragmentFitter(Linear(), 0)
        for y in [10, 12, 14, 16]:
            assert f.try_extend(y)
        th1, th2 = f.params()
        assert th1 == pytest.approx(2.0)

    def test_quadratic3_anchor_exact(self):
        fam = Quadratic3()
        data = [100, 105, 120, 150]
        f = FragmentFitter(fam, 3)
        for y in data:
            assert f.try_extend(y)
        params = f.params()
        assert fam.evaluate1(params, 1.0) == pytest.approx(100.0, abs=1e-9)

    def test_default_families_are_papers_four(self):
        kinds = {f.kind for f in DEFAULT_FAMILIES}
        assert kinds == {"linear", "exponential", "quadratic3", "radical"}

    def test_family_by_kind_roundtrip(self):
        for f in FAMILIES:
            assert family_by_kind(f.kind).kind == f.kind
