"""EFO-like domain ontology for SemProp (substitute for EFO + ChEMBL link).

SemProp's semantic matcher links attribute names to ontology classes via
embedding similarity and then relates attributes transitively through
shared classes. The paper could only run SemProp on ChEMBL because it is
"one of the few datasets that come with an ontology". This module ships
a small Experimental-Factor-Ontology-like class hierarchy whose labels
and synonyms cover the bioassay domain of
:func:`repro.valentine_data.sources.chembl_assays`.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class OntologyClass:
    """One ontology class: stable id, preferred label, synonyms, parent."""

    id: str
    label: str
    synonyms: tuple[str, ...] = ()
    parent: str | None = None

    @property
    def names(self) -> tuple[str, ...]:
        return (self.label, *self.synonyms)


@dataclass
class Ontology:
    """A flat-indexed class collection with parent links."""

    name: str
    classes: list[OntologyClass] = field(default_factory=list)

    def __post_init__(self):
        ids = [c.id for c in self.classes]
        if len(ids) != len(set(ids)):
            raise ValueError(f"duplicate class ids in ontology {self.name!r}")
        self._by_id = {c.id: c for c in self.classes}
        for c in self.classes:
            if c.parent is not None and c.parent not in self._by_id:
                raise ValueError(f"class {c.id} has unknown parent {c.parent}")

    def get(self, cid: str) -> OntologyClass:
        return self._by_id[cid]

    def ancestors(self, cid: str) -> list[OntologyClass]:
        """Parent chain, closest first."""
        out, cur = [], self._by_id[cid].parent
        while cur is not None:
            out.append(self._by_id[cur])
            cur = self._by_id[cur].parent
        return out


def efo_like_ontology() -> Ontology:
    """The bioassay ontology used by SemProp in this reproduction."""
    C = OntologyClass
    return Ontology("efo_like", [
        C("efo:0000001", "experimental factor"),
        C("efo:0000002", "assay", ("experiment", "test", "measurement"),
          parent="efo:0000001"),
        C("efo:0000003", "assay type", ("experiment type", "test category"),
          parent="efo:0000002"),
        C("efo:0000004", "organism", ("species", "taxon"),
          parent="efo:0000001"),
        C("efo:0000005", "strain", ("breed", "variant"), parent="efo:0000004"),
        C("efo:0000006", "tissue", ("organ", "anatomical part"),
          parent="efo:0000004"),
        C("efo:0000007", "cell type", ("cell line", "cell"),
          parent="efo:0000006"),
        C("efo:0000008", "subcellular fraction", ("cell component",
          "organelle"), parent="efo:0000007"),
        C("efo:0000009", "target", ("protein target", "goal"),
          parent="efo:0000001"),
        C("efo:0000010", "target type", ("target category",),
          parent="efo:0000009"),
        C("efo:0000011", "confidence score", ("confidence", "score",
          "rating"), parent="efo:0000001"),
        C("efo:0000012", "description", ("comment", "notes", "text"),
          parent="efo:0000001"),
        C("efo:0000013", "document", ("publication", "paper", "doc"),
          parent="efo:0000001"),
        C("efo:0000014", "source", ("origin", "provider"),
          parent="efo:0000001"),
        C("efo:0000015", "identifier", ("id", "accession", "code"),
          parent="efo:0000001"),
        C("efo:0000016", "version", ("release", "revision"),
          parent="efo:0000001"),
        C("efo:0000017", "relationship type", ("relation", "link type"),
          parent="efo:0000001"),
        C("efo:0000018", "format", ("encoding", "layout"),
          parent="efo:0000001"),
        C("efo:0000019", "curation", ("curated by", "annotation"),
          parent="efo:0000001"),
        C("efo:0000020", "taxonomy id", ("tax id", "taxon identifier"),
          parent="efo:0000015"),
    ])
