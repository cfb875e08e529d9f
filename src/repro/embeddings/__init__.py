"""Word-embedding substrate.

The paper relies on pre-trained dictionaries (GloVe-840B, GloVe-Wiki,
word2vec, fastText, a Spanish dictionary, a biomedical dictionary). The
container is offline, so ``pretrained`` builds deterministic synthetic
dictionaries with the two properties DeepER exploits: semantically related
surface forms are geometrically close, and coverage is finite (OOV path).
``retrofit`` implements the paper's vocabulary-retrofitting (§3.2).
"""
from repro.embeddings.pretrained import (
    SyntheticEmbeddings,
    bio_dict,
    fasttext,
    glove840,
    glove_wiki,
    spanish_glove,
    word2vec,
)
from repro.embeddings.retrofit import retrofit_vocabulary
from repro.embeddings.tokenize import tokenize

__all__ = [
    "SyntheticEmbeddings",
    "tokenize",
    "retrofit_vocabulary",
    "glove840",
    "glove_wiki",
    "word2vec",
    "fasttext",
    "spanish_glove",
    "bio_dict",
]
