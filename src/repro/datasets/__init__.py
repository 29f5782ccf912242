"""Synthetic stand-ins for the paper's evaluation datasets + missingness."""
from .base import Dataset
from .missing import inject_missing
from . import airquality, flight, retailer

__all__ = ["Dataset", "inject_missing", "flight", "retailer", "airquality"]
