"""The paper's core contribution: get-next reranking algorithms (1D/MD),
the dense-region index, sessions, the re-rank operator, and the service."""
from .dense_index import DenseIndex  # noqa: F401
from .multidim import ALGORITHMS_MD, MDBaseline, MDBinary, MDRerank  # noqa: F401
from .onedim import ALGORITHMS_1D, OneDBaseline, OneDBinary, OneDRerank  # noqa: F401
from .rerank_op import ground_truth_topk, rerank_df, rerank_with_udf  # noqa: F401
from .service import QR2Service, UserQuery  # noqa: F401
from .session import Session  # noqa: F401
from .ta import MDTA  # noqa: F401
