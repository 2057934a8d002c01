"""Spatial primitives mirroring AsterixDB's spatial functions.

The paper's UDFs use ``create_point``, ``create_circle``, ``create_
rectangle`` and ``spatial_intersect``/``spatial_distance`` over plain
degree coordinates (no geodesy — a circle of "1.5 degrees" is Euclidean
in degree space). These helpers express the same predicates as Spark
``Column`` expressions so Catalyst can plan the joins.
"""
from pyspark.sql import Column
from pyspark.sql import functions as F


def euclidean_distance(lat1: Column, lon1: Column, lat2: Column, lon2: Column) -> Column:
    """``spatial_distance(point1, point2)`` — Euclidean in degree space."""
    return F.sqrt((lat1 - lat2) ** 2 + (lon1 - lon2) ** 2)


def point_in_circle(lat: Column, lon: Column,
                    center_lat: Column, center_lon: Column,
                    radius: float) -> Column:
    """``spatial_intersect(point, create_circle(center, radius))``."""
    return euclidean_distance(lat, lon, center_lat, center_lon) <= F.lit(radius)


def point_in_rectangle(lat: Column, lon: Column,
                       x_lo: Column, y_lo: Column,
                       x_hi: Column, y_hi: Column) -> Column:
    """``spatial_intersect(point, rectangle)``.

    Rectangles store (x_lo, y_lo)-(x_hi, y_hi); ``x`` spans longitude
    and ``y`` latitude. Lower/left edges are inclusive and upper/right
    exclusive so a grid tiling assigns each point to exactly one
    district (the paper's districts partition space the same way).
    """
    return (lon >= x_lo) & (lon < x_hi) & (lat >= y_lo) & (lat < y_hi)


def sql_distance(lat1: str, lon1: str, lat2: str, lon2: str) -> str:
    """The DuckDB/SQL text equivalent of :func:`euclidean_distance`.

    Used by the oracle tests so Spark and DuckDB evaluate the same
    predicate independently.
    """
    return f"sqrt(({lat1} - {lat2}) * ({lat1} - {lat2}) + ({lon1} - {lon2}) * ({lon1} - {lon2}))"
