"""Synthetic stand-ins for the paper's dataset sources (DESIGN.md §5).

Fabrication sources (fed to ``repro.fabrication.pair_census``):
  * ``tpcdi_prospect`` — TPC-DI *Prospect* table (22 cols).
  * ``opendata_table`` — Open-Data-style wide table (51 cols).
  * ``chembl_assays`` — ChEMBL *Assays* table (23 cols), aligned with
    the EFO-like ontology in ``ontology``.

Human-curated-style pair sources (ground truth by construction):
  * ``wikidata`` — singers pair with alternative value encodings.
  * ``magellan`` — 7 unionable pairs with verbatim column names.
  * ``ing`` — SCRUM-backlog and app-inventory pairs.
"""
from repro.valentine_data.sources import chembl_assays, opendata_table, tpcdi_prospect
from repro.valentine_data.ontology import Ontology, OntologyClass, efo_like_ontology

__all__ = [
    "tpcdi_prospect",
    "opendata_table",
    "chembl_assays",
    "Ontology",
    "OntologyClass",
    "efo_like_ontology",
]
