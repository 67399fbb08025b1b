"""The paper's eleven comparison algorithms (§6.1 list)."""
from .clique_cs import clique_cs
from .cnm import cnm
from .gn import gn
from .kcore_cs import highcore, kc
from .kecc_cs import kecc_cs
from .ktruss_cs import hightruss, huang2015, kt
from .luo import icwi2008
from .wu2015 import wu2015

__all__ = [
    "clique_cs",
    "cnm",
    "gn",
    "kc",
    "highcore",
    "kt",
    "hightruss",
    "huang2015",
    "kecc_cs",
    "icwi2008",
    "wu2015",
]
