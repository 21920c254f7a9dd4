"""Synthetic maritime regions: ports, shipping lanes, projection anchors.

The paper evaluates on two real regions (around Denmark; the Saronic gulf).
Those AIS feeds are unavailable offline, so this module defines synthetic
regions with the same *structure*: a projection anchor, a set of ports, and
curved lane polylines between ports. Lane curvature is what makes the
imputation problem non-trivial — a straight-line baseline (SLI) cannot track
the turns, while the data-driven methods can.

Coordinates approximate the real geography so that the H3-equivalent grid
resolutions carry the paper's meaning, but no land-mask is modeled (none of
the paper's tables measures land crossings).
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class Port:
    """A named port location (degrees)."""

    name: str
    lon: float
    lat: float


@dataclass(frozen=True)
class Route:
    """A one-way lane polyline between two ports (list of lon/lat vertices)."""

    name: str
    waypoints: tuple[tuple[float, float], ...]

    def reversed(self) -> "Route":
        """The same lane sailed in the opposite direction."""
        return Route(self.name + ":rev", tuple(self.waypoints[::-1]))


@dataclass(frozen=True)
class Region:
    """A maritime region: projection anchor + ports + lanes."""

    name: str
    lon0: float
    lat0: float
    ports: tuple[Port, ...] = field(default_factory=tuple)
    routes: tuple[Route, ...] = field(default_factory=tuple)

    def both_ways(self) -> list[Route]:
        """All routes in both sailing directions."""
        out: list[Route] = []
        for r in self.routes:
            out.append(r)
            out.append(r.reversed())
        return out


def _r(name: str, *pts: tuple[float, float]) -> Route:
    return Route(name, tuple(pts))


# --- Denmark area (DAN / KIEL scenarios) -----------------------------------

_DAN_PORTS = (
    Port("COPENHAGEN", 12.60, 55.70),
    Port("AARHUS", 10.22, 56.15),
    Port("KIEL", 10.16, 54.33),
    Port("GOTHENBURG", 11.85, 57.60),
    Port("ROSTOCK", 12.10, 54.15),
    Port("AALBORG", 9.95, 57.05),
    Port("HELSINGBORG", 12.69, 56.04),
    Port("MALMO", 12.95, 55.62),
    Port("FREDERIKSHAVN", 10.55, 57.44),
    Port("ODENSE", 10.50, 55.47),
)

#: The single Kiel–Gothenburg lane: threads the Great Belt with pronounced
#: turns (the KIEL scenario's "specific, confined route").
KIEL_GOTHENBURG = _r(
    "KIEL-GOTHENBURG",
    (10.16, 54.33),
    (10.45, 54.48),
    (10.80, 54.62),
    (10.93, 55.00),
    (11.05, 55.35),
    (10.98, 55.75),
    (10.82, 56.10),
    (10.95, 56.55),
    (11.25, 57.00),
    (11.55, 57.35),
    (11.85, 57.60),
)

_DAN_ROUTES = (
    KIEL_GOTHENBURG,
    _r(
        "COPENHAGEN-GOTHENBURG",
        (12.60, 55.70),
        (12.68, 55.92),
        (12.62, 56.10),
        (12.40, 56.35),
        (12.10, 56.75),
        (11.95, 57.20),
        (11.85, 57.60),
    ),
    _r(
        "COPENHAGEN-ROSTOCK",
        (12.60, 55.70),
        (12.55, 55.45),
        (12.35, 55.15),
        (12.20, 54.75),
        (12.10, 54.15),
    ),
    _r(
        "AARHUS-COPENHAGEN",
        (10.22, 56.15),
        (10.65, 56.05),
        (11.10, 55.95),
        (11.60, 55.85),
        (12.05, 55.95),
        (12.45, 55.85),
        (12.60, 55.70),
    ),
    _r(
        "AARHUS-GOTHENBURG",
        (10.22, 56.15),
        (10.60, 56.35),
        (10.95, 56.60),
        (11.25, 57.00),
        (11.55, 57.35),
        (11.85, 57.60),
    ),
    _r(
        "KIEL-COPENHAGEN",
        (10.16, 54.33),
        (10.60, 54.45),
        (11.10, 54.55),
        (11.70, 54.70),
        (12.20, 54.95),
        (12.45, 55.30),
        (12.60, 55.70),
    ),
    _r(
        "ODENSE-AARHUS",
        (10.50, 55.47),
        (10.72, 55.70),
        (10.85, 55.95),
        (10.55, 56.08),
        (10.22, 56.15),
    ),
    _r(
        "FREDERIKSHAVN-GOTHENBURG",
        (10.55, 57.44),
        (10.95, 57.48),
        (11.40, 57.53),
        (11.85, 57.60),
    ),
    _r(
        "AALBORG-FREDERIKSHAVN",
        (9.95, 57.05),
        (10.30, 57.18),
        (10.48, 57.32),
        (10.55, 57.44),
    ),
    _r(
        "HELSINGBORG-MALMO",
        (12.69, 56.04),
        (12.62, 55.90),
        (12.72, 55.75),
        (12.95, 55.62),
    ),
    _r(
        "ROSTOCK-MALMO",
        (12.10, 54.15),
        (12.35, 54.55),
        (12.60, 55.00),
        (12.82, 55.35),
        (12.95, 55.62),
    ),
)

DAN_REGION = Region("DAN", lon0=11.5, lat0=56.0, ports=_DAN_PORTS, routes=_DAN_ROUTES)

#: KIEL scenario: same anchor as DAN (same waters), single route, two ships.
KIEL_REGION = Region("KIEL", lon0=11.5, lat0=56.0, ports=_DAN_PORTS[2:4], routes=(KIEL_GOTHENBURG,))


# --- Saronic gulf (SAR scenario) -------------------------------------------

_SAR_PORTS = (
    Port("PIRAEUS", 23.62, 37.94),
    Port("AEGINA", 23.43, 37.75),
    Port("AGIA_MARINA", 23.53, 37.74),
    Port("POROS", 23.45, 37.50),
    Port("METHANA", 23.39, 37.58),
    Port("SALAMINA", 23.50, 37.93),
    Port("SOUNIO", 24.00, 37.66),
    Port("EPIDAVROS", 23.16, 37.63),
    Port("HYDRA", 23.47, 37.35),
    Port("ISTHMIA", 23.00, 37.91),
)

_SAR_ROUTES = (
    _r("PIRAEUS-AEGINA", (23.62, 37.94), (23.55, 37.86), (23.47, 37.80), (23.43, 37.75)),
    _r("PIRAEUS-AGIA_MARINA", (23.62, 37.94), (23.58, 37.85), (23.55, 37.79), (23.53, 37.74)),
    _r(
        "PIRAEUS-POROS",
        (23.62, 37.94),
        (23.53, 37.84),
        (23.45, 37.73),
        (23.38, 37.62),
        (23.42, 37.54),
        (23.45, 37.50),
    ),
    _r(
        "PIRAEUS-HYDRA",
        (23.62, 37.94),
        (23.52, 37.82),
        (23.42, 37.68),
        (23.36, 37.55),
        (23.40, 37.43),
        (23.47, 37.35),
    ),
    _r("PIRAEUS-METHANA", (23.62, 37.94), (23.52, 37.82), (23.44, 37.70), (23.39, 37.58)),
    _r("AEGINA-METHANA", (23.43, 37.75), (23.38, 37.68), (23.39, 37.58)),
    _r(
        "PIRAEUS-SOUNIO",
        (23.62, 37.94),
        (23.68, 37.84),
        (23.80, 37.74),
        (23.92, 37.68),
        (24.00, 37.66),
    ),
    _r(
        "PIRAEUS-ISTHMIA",
        (23.62, 37.94),
        (23.50, 37.90),
        (23.35, 37.87),
        (23.20, 37.90),
        (23.00, 37.91),
    ),
    _r("EPIDAVROS-AEGINA", (23.16, 37.63), (23.28, 37.68), (23.38, 37.72), (23.43, 37.75)),
    _r(
        "SOUNIO-HYDRA",
        (24.00, 37.66),
        (23.88, 37.55),
        (23.72, 37.45),
        (23.58, 37.38),
        (23.47, 37.35),
    ),
)

SAR_REGION = Region("SAR", lon0=23.5, lat0=37.7, ports=_SAR_PORTS, routes=_SAR_ROUTES)

#: SAR wanderer bounding box (fishing / pleasure craft random tracks).
SAR_BOX = (23.05, 37.40, 23.95, 37.95)  # lon_min, lat_min, lon_max, lat_max
