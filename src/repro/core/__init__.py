"""Core of the reproduction: spec, dominance, BNL, plan, optimizer, physical."""
from .spec import DimType, SkylineDimension, SkylineSpec, smin, smax, sdiff, spec_of  # noqa: F401
