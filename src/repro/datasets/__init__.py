"""Evaluation datasets (paper Sec. 7.1): synthetic stand-ins for
FlightData, AdultData, StaplesData, CancerData (LUCAS) and the row-level
expansion of the published BerkeleyData table. See DESIGN.md for the
substitution rationale per dataset."""
from repro.datasets import adult, berkeley, cancer, flight, staples

__all__ = ["adult", "berkeley", "cancer", "flight", "staples"]
